"""Reproduce Table V: ISLA at r/3 vs US and STS at r (e = 0.5)."""
import sys

sys.path.insert(0, __file__.rsplit("/", 2)[0] + "/jobs")
from _common import emit, session  # noqa: E402

from repro.experiments import run_table5  # noqa: E402
from repro.experiments.runner import fmt_table  # noqa: E402


def main(n: int = 1_000_000) -> dict:
    spark = session("table5")
    res = run_table5(spark, n=n)
    rows = [[m] + [round(x, 4) for x in res[m]] for m in ("ISLA", "US", "STS")]
    md = fmt_table(
        ["Data set"] + [str(d) for d in res["datasets"]], rows
    )
    md += (
        f"\n\nISLA participating samples: {res['isla_samples']}"
        f" — US/STS sample size m: {res['us_samples']}"
    )
    emit("table5", res, md)
    return res


if __name__ == "__main__":
    main(*(int(a) for a in sys.argv[1:]))
