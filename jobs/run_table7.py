"""Reproduce Table VII: uniform distributions, ISLA vs MV vs MVB."""
import sys

sys.path.insert(0, __file__.rsplit("/", 2)[0] + "/jobs")
from _common import emit, session  # noqa: E402

from repro.experiments import run_table7  # noqa: E402
from repro.experiments.runner import fmt_table  # noqa: E402


def main(n: int = 1_000_000) -> dict:
    spark = session("table7")
    res = run_table7(spark, n=n)
    rows = [[m] + [round(x, 4) for x in res[m]] for m in ("ISLA", "MV", "MVB")]
    md = fmt_table(["Dataset"] + [str(d) for d in res["datasets"]], rows)
    emit("table7", res, md)
    return res


if __name__ == "__main__":
    main(*(int(a) for a in sys.argv[1:]))
