"""Legacy setuptools shim so `pip install -e .` works offline.

The container has no network and no `wheel` package, so pip's PEP 517
editable path (which requires bdist_wheel) fails. With no [build-system]
table in pyproject.toml, pip falls back to `setup.py develop`, which this
shim provides. Metadata lives in pyproject.toml's [project] table.
"""
from setuptools import find_packages, setup

setup(
    name="repro",
    version="0.1.0",
    package_dir={"": "src"},
    packages=find_packages(where="src"),
    python_requires=">=3.11",
)
