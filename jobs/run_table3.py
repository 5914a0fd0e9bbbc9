"""Reproduce Table III: ISLA vs MV vs MVB accuracy on N(100, 20²)."""
import sys

sys.path.insert(0, __file__.rsplit("/", 2)[0] + "/jobs")
from _common import emit, session  # noqa: E402

from repro.experiments import run_table3  # noqa: E402
from repro.experiments.runner import fmt_table  # noqa: E402


def main(n: int = 1_000_000, n_datasets: int = 10) -> dict:
    spark = session("table3")
    res = run_table3(spark, n=n, n_datasets=n_datasets)
    rows = [
        [m] + [round(x, 4) for x in res[m]] + [round(res[f"{m}_avg"], 4)]
        for m in ("ISLA", "MV", "MVB")
    ]
    md = fmt_table(
        ["Method"] + [str(d) for d in res["datasets"]] + ["Average"], rows
    )
    emit("table3", res, md)
    return res


if __name__ == "__main__":
    main(*(int(a) for a in sys.argv[1:]))
