"""Local SparkSession bootstrap for the ``jobs/`` entry points.

pytest runs use the session fixture in ``conftest.py``; standalone jobs
(``python jobs/<name>.py`` or ``spark-submit``) go through here so they get
the same memory sizing (driver memory must be fixed before the JVM starts,
hence the env-var dance) and the same session configs: shuffle partitions,
Arrow, and broadcast joins disabled (explicit ``F.broadcast`` hints still
apply where an algorithm calls for them).
"""
from __future__ import annotations

import os


def _driver_mem() -> str:
    """~75% of the cgroup memory limit, else 16g (mirrors conftest.py)."""
    if m := os.environ.get("SPARK_DRIVER_MEM"):
        return m
    for p in (
        "/sys/fs/cgroup/memory.max",
        "/sys/fs/cgroup/memory/memory.limit_in_bytes",
    ):
        try:
            raw = open(p).read().strip()
            if not raw or raw == "max":
                continue
            gib = int(raw) / (1 << 30)
            if 1 <= gib <= 1024:
                return f"{max(1, int(gib * 0.75))}g"
        except (OSError, ValueError):
            continue
    return "16g"


def local_session(app_name: str):
    """A local[*] session sized like the test fixture's."""
    os.environ.setdefault("SPARK_DRIVER_MEM", _driver_mem())
    os.environ.setdefault(
        "PYSPARK_SUBMIT_ARGS",
        f"--master {os.environ.get('SPARK_MASTER', 'local[*]')} "
        f"--driver-memory {os.environ['SPARK_DRIVER_MEM']} "
        "--conf spark.driver.host=127.0.0.1 "
        "--conf spark.ui.enabled=false pyspark-shell",
    )
    from pyspark.sql import SparkSession

    s = (
        SparkSession.builder.appName(app_name)
        .config(
            "spark.sql.shuffle.partitions",
            os.environ.get("SPARK_SHUFFLE_PARTITIONS", "64"),
        )
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .getOrCreate()
    )
    s.sparkContext.setLogLevel("ERROR")
    return s
