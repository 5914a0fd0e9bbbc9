"""Shared experiment plumbing: sizes, ground truth, formatting."""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F


def round_robin_sizes(n: int, b: int) -> dict[int, int]:
    """|B_j| for the ``id % b`` block assignment of the generators.

    Block j holds the ids ≡ j (mod b) in [0, n), i.e. ⌈(n − j)/b⌉ rows.
    Passing these as metadata mirrors the paper's assumption that M and
    block sizes come from the catalog, and skips a count job.
    """
    return {j: (n - j + b - 1) // b for j in range(b)}


def exact_avg(df: DataFrame, value_col: str) -> float:
    """Ground-truth AVG by full scan (the paper's golden truth)."""
    row = df.agg(F.avg(F.col(value_col).cast("double")).alias("avg")).first()
    return float(row["avg"])


def fmt_table(headers: list[str], rows: list[list]) -> str:
    """Render a result grid as GitHub-flavoured markdown."""
    def cell(x) -> str:
        if isinstance(x, float):
            return f"{x:.4f}"
        return str(x)

    out = ["| " + " | ".join(headers) + " |",
           "|" + "|".join("---" for _ in headers) + "|"]
    for r in rows:
        out.append("| " + " | ".join(cell(x) for x in r) + " |")
    return "\n".join(out)
