"""Pandas-UDF bridges exposing the shared splitmix64 draws to Spark SQL.

The incremental algorithm's auxiliary draws (re-pick index, re-pick
position, Theorem 5 keep-or-switch coin) must come from the *same* hash
kernel as the NumPy reference (``repro.core.rand``), otherwise the
bit-equality between engines breaks. These factories close over
``(seed, purpose, epoch)`` and hash the per-row ``(id, t)`` keys plus an
optional modulus column, vectorized per Arrow batch.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql.functions import pandas_udf

from repro.core import rand


def mod_udf(seed: int, purpose: int, epoch: int):
    """UDF ``(mod, id, t) -> uniform int in [0, mod)`` (mod may vary per row)."""

    @pandas_udf("long")
    def f(mod: pd.Series, vid: pd.Series, t: pd.Series) -> pd.Series:
        out = rand.hash_mod(
            seed,
            purpose,
            mod.to_numpy(np.int64),
            epoch,
            vid.to_numpy(np.int64),
            t.to_numpy(np.int64),
        )
        return pd.Series(out)

    return f


def unit_udf(seed: int, purpose: int, epoch: int):
    """UDF ``(id, t) -> uniform float64 in [0, 1)``."""

    @pandas_udf("double")
    def f(vid: pd.Series, t: pd.Series) -> pd.Series:
        out = rand.hash_unit(
            seed, purpose, epoch, vid.to_numpy(np.int64), t.to_numpy(np.int64)
        )
        return pd.Series(out)

    return f
