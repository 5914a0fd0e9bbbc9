"""Reproduce §VIII-D: AVG aggregation on non-i.i.d. blocks."""
import sys

sys.path.insert(0, __file__.rsplit("/", 2)[0] + "/jobs")
from _common import emit, session  # noqa: E402

from repro.experiments import run_noniid  # noqa: E402
from repro.experiments.runner import fmt_table  # noqa: E402


def main(n_per_block: int = 200_000) -> dict:
    spark = session("noniid")
    res = run_noniid(spark, n_per_block=n_per_block)
    md = fmt_table(
        ["Run"] + [str(i + 1) for i in range(len(res["ISLA"]))],
        [["ISLA"] + [round(x, 4) for x in res["ISLA"]]],
    )
    md += f"\n\naccurate = {res['accurate']}, e = {res['e']}"
    emit("noniid", res, md)
    return res


if __name__ == "__main__":
    main(*(int(a) for a in sys.argv[1:]))
