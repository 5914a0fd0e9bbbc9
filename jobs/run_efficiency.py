"""Reproduce §VIII-F: run-time comparison on TPC-H(-lite) LINEITEM."""
import sys

sys.path.insert(0, __file__.rsplit("/", 2)[0] + "/jobs")
from _common import emit, session  # noqa: E402

from repro.experiments import run_efficiency  # noqa: E402
from repro.experiments.runner import fmt_table  # noqa: E402


def main(repeats: int = 3) -> dict:
    spark = session("efficiency")
    res = run_efficiency(spark, repeats=repeats)
    methods = ["ISLA", "MV", "MVB", "US", "STS"]
    md = fmt_table(
        ["Metric"] + methods,
        [
            ["time_ms"] + [round(res["time_ms"][m], 1) for m in methods],
            ["answer"] + [round(res["answers"][m], 2) for m in methods],
        ],
    )
    md += f"\n\naccurate = {res['accurate']:.2f}, rate = {res['rate']:.4f}, repeats = {res['repeats']}"
    emit("efficiency", res, md)
    return res


if __name__ == "__main__":
    main(*(int(a) for a in sys.argv[1:]))
