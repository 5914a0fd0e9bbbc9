"""US — uniform sampling baseline (§VIII-B).

The estimator is the plain mean of a uniform Bernoulli sample at the
Eq. (1) rate: every sample weighted 1/m ("equally dividing the sum").
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F


def uniform_avg(
    df: DataFrame, value_col: str, rate: float, *, seed: int = 0
) -> float:
    """AVG over a uniform sample of ``df`` at ``rate``."""
    if not 0.0 < rate <= 1.0:
        raise ValueError(f"rate must be in (0, 1], got {rate}")
    sampled = df if rate >= 1.0 else df.sample(fraction=rate, seed=seed)
    row = sampled.agg(F.avg(F.col(value_col).cast("double")).alias("avg")).first()
    if row["avg"] is None:
        raise ValueError("uniform sample was empty — rate too small")
    return float(row["avg"])
