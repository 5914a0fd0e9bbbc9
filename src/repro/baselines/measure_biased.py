"""MV / MVB — the sample+seek measure-biased technique (§VIII-C).

Per §VIII-C the comparison re-weights a *uniform* sample with the
measure-biased probabilities of Eq. (4):

* **MV** ("probabilities on values"): ``prob_i = a_i/Σa`` over the whole
  sample, so the estimate is ``Σ prob_i·a_i = Σa²/Σa``. Closed form on
  N(μ, σ²): (μ²+σ²)/μ (= 104.0 for the paper's default data — exactly
  the Table III MV row); on Exp(γ): 2/γ (= the Table VI MV row).
* **MVB** ("probabilities on values and boundaries"): samples are
  divided by the ISLA data boundaries into the 5 regions; each region's
  probability mass is its sample share ``n_g/m`` (the Constraint-2
  analogue) and within a region probabilities are proportional to
  values, so the estimate is ``Σ_g (n_g/m)·(Σ_g a²/Σ_g a)``.

Per-block variants back the Table IV partial-answer comparison.
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.core.boundaries import DataBoundaries, region_column_for


def _sample(df: DataFrame, rate: float, seed: int) -> DataFrame:
    if not 0.0 < rate <= 1.0:
        raise ValueError(f"rate must be in (0, 1], got {rate}")
    return df if rate >= 1.0 else df.sample(fraction=rate, seed=seed)


def mv_avg(df: DataFrame, value_col: str, rate: float, *, seed: int = 0) -> float:
    """MV estimate Σa²/Σa over a uniform sample."""
    v = F.col(value_col).cast("double")
    row = (
        _sample(df, rate, seed)
        .agg(F.sum(v * v).alias("s2"), F.sum(v).alias("s1"))
        .first()
    )
    if row["s1"] is None or row["s1"] == 0:
        raise ValueError("MV sample empty or sums to zero")
    return float(row["s2"]) / float(row["s1"])


def mv_block_avgs(
    df: DataFrame, value_col: str, block_col: str, rate: float, *, seed: int = 0
) -> dict:
    """Per-block MV estimates (Table IV partials)."""
    v = F.col(value_col).cast("double")
    rows = (
        _sample(df, rate, seed)
        .groupBy(block_col)
        .agg(F.sum(v * v).alias("s2"), F.sum(v).alias("s1"))
        .collect()
    )
    return {r[block_col]: float(r["s2"]) / float(r["s1"]) for r in rows if r["s1"]}


def _mvb_from_region_rows(rows) -> float:
    """Combine (n_g, Σa_g, Σa²_g) region rows into the MVB estimate."""
    m = sum(int(r["n"]) for r in rows)
    if m == 0:
        raise ValueError("MVB sample empty")
    est = 0.0
    for r in rows:
        s1 = float(r["s1"])
        if s1 == 0.0:
            continue  # a region whose values sum to zero carries no mass
        est += (int(r["n"]) / m) * (float(r["s2"]) / s1)
    return est


def mvb_avg(
    df: DataFrame,
    value_col: str,
    rate: float,
    bounds: DataBoundaries,
    *,
    seed: int = 0,
) -> float:
    """MVB estimate Σ_g (n_g/m)·Σ_g a²/Σ_g a over the 5 regions."""
    v = F.col(value_col).cast("double")
    rows = (
        _sample(df, rate, seed)
        .withColumn("__region", region_column_for(bounds, v))
        .groupBy("__region")
        .agg(F.count("*").alias("n"), F.sum(v).alias("s1"), F.sum(v * v).alias("s2"))
        .collect()
    )
    return _mvb_from_region_rows(rows)


def mvb_block_avgs(
    df: DataFrame,
    value_col: str,
    block_col: str,
    rate: float,
    bounds: DataBoundaries,
    *,
    seed: int = 0,
) -> dict:
    """Per-block MVB estimates (Table IV partials)."""
    v = F.col(value_col).cast("double")
    rows = (
        _sample(df, rate, seed)
        .withColumn("__region", region_column_for(bounds, v))
        .groupBy(block_col, "__region")
        .agg(F.count("*").alias("n"), F.sum(v).alias("s1"), F.sum(v * v).alias("s2"))
        .collect()
    )
    by_block: dict = {}
    for r in rows:
        by_block.setdefault(r[block_col], []).append(r)
    return {b: _mvb_from_region_rows(rs) for b, rs in by_block.items()}
