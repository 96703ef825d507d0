"""Missing-data injection mechanisms for the Fig 3 robustness experiment.

Two removal modes, matching §5.2: *missing-at-random* (each value nulled
with probability ``frac``) and *biased removal* (the top-``frac`` highest
values nulled — a missing-not-at-random mechanism that induces selection
bias, which IPW must correct and naive imputation must not hide).
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F


def remove_mcar(df: DataFrame, col: str, frac: float, *, seed: int = 0) -> DataFrame:
    """Null out ``frac`` of ``col`` uniformly at random (deterministic seed)."""
    if not 0.0 <= frac <= 1.0:
        raise ValueError("frac must be in [0, 1]")
    keep = F.rand(seed) >= F.lit(frac)
    return df.withColumn(col, F.when(keep, F.col(col)))


def remove_biased_top(df: DataFrame, col: str, frac: float) -> DataFrame:
    """Null the top-``frac`` largest values of numeric ``col``.

    This is the paper's "biased removal, where the top-x highest values from
    examined attributes were omitted": the retained complete cases are
    systematically lower than the population, i.e. selection bias.
    """
    if not 0.0 <= frac <= 1.0:
        raise ValueError("frac must be in [0, 1]")
    if frac == 0.0:
        return df
    if frac == 1.0:
        return df.withColumn(col, F.lit(None).cast(dict(df.dtypes)[col]))
    [thresh] = df.where(F.col(col).isNotNull()).approxQuantile(
        col, [1.0 - frac], 0.001
    )
    return df.withColumn(col, F.when(F.col(col) < F.lit(thresh), F.col(col)))


def missing_fraction(df: DataFrame, cols: list[str]) -> dict[str, float]:
    """Fraction of nulls per column, one distributed pass."""
    if not cols:
        return {}
    row = df.agg(
        *[F.avg(F.col(c).isNull().cast("double")).alias(c) for c in cols]
    ).collect()[0]
    return {c: float(row[c]) for c in cols}
