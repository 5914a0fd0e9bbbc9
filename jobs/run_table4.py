"""Reproduce Table IV: per-block partial answers (modulation abilities)."""
import sys

sys.path.insert(0, __file__.rsplit("/", 2)[0] + "/jobs")
from _common import emit, session  # noqa: E402

from repro.experiments import run_table4  # noqa: E402
from repro.experiments.runner import fmt_table  # noqa: E402


def main(n: int = 1_000_000) -> dict:
    spark = session("table4")
    res = run_table4(spark, n=n)
    rows = [
        [m] + [round(x, 4) for x in res[m]]
        + [round(sum(res[m]) / len(res[m]), 4)]
        for m in ("ISLA", "MV", "MVB")
    ]
    md = fmt_table(
        ["Partial"] + [str(b + 1) for b in res["blocks"]] + ["Average"], rows
    )
    md += f"\n\nsketch0 = {res['sketch0']:.4f}, ISLA final = {res['ISLA_final']:.4f}"
    emit("table4", res, md)
    return res


if __name__ == "__main__":
    main(*(int(a) for a in sys.argv[1:]))
