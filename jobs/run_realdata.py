"""Reproduce §VIII-G: salary-like and TLC-like data, ISLA at half m."""
import sys

sys.path.insert(0, __file__.rsplit("/", 2)[0] + "/jobs")
from _common import emit, session  # noqa: E402

from repro.experiments import run_realdata  # noqa: E402
from repro.experiments.runner import fmt_table  # noqa: E402


def main() -> dict:
    spark = session("realdata")
    res = run_realdata(spark)
    rows = []
    for name in ("salary", "tlc"):
        r = res[name]
        rows.append(
            [name, round(r["accurate"], 2)]
            + [round(r[m], 2) for m in ("ISLA", "MV", "MVB", "US", "STS")]
        )
    md = fmt_table(
        ["Dataset", "Accurate", "ISLA", "MV", "MVB", "US", "STS"], rows
    )
    emit("realdata", res, md)
    return res


if __name__ == "__main__":
    main()
