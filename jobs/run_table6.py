"""Reproduce Table VI: exponential distributions, ISLA vs MV vs MVB."""
import sys

sys.path.insert(0, __file__.rsplit("/", 2)[0] + "/jobs")
from _common import emit, session  # noqa: E402

from repro.experiments import run_table6  # noqa: E402
from repro.experiments.runner import fmt_table  # noqa: E402


def main(n: int = 1_000_000) -> dict:
    spark = session("table6")
    res = run_table6(spark, n=n)
    rows = [
        [m] + [round(x, 4) for x in res[m]]
        for m in ("Accurate", "ISLA", "MV", "MVB")
    ]
    md = fmt_table(["γ"] + [str(g) for g in res["gammas"]], rows)
    emit("table6", res, md)
    return res


if __name__ == "__main__":
    main(*(int(a) for a in sys.argv[1:]))
