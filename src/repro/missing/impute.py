"""Single-imputation baseline (mean/mode) used by the Fig 3 comparison.

The paper contrasts MESA's IPW approach against "the common mean imputation
technique" and shows imputation badly distorts explainability as
missingness grows; this module is that comparator.
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.core.query import is_numeric


def impute_mean(df: DataFrame, cols: list[str]) -> DataFrame:
    """Fill numeric columns with their mean, categoricals with their mode.

    Single distributed pass for all means; one small job per categorical
    mode (categoricals are rare among extracted attributes).
    """
    numeric = [c for c in cols if is_numeric(df, c)]
    categorical = [c for c in cols if c not in numeric]
    if numeric:
        means = df.agg(*[F.avg(c).alias(c) for c in numeric]).collect()[0]
        df = df.fillna({c: float(means[c]) for c in numeric if means[c] is not None})
    for c in categorical:
        top = (
            df.where(F.col(c).isNotNull())
            .groupBy(c)
            .count()
            .orderBy(F.desc("count"), c)
            .limit(1)
            .collect()
        )
        if top:
            df = df.fillna({c: top[0][c]})
    return df
