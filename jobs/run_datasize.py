"""Reproduce §VIII-A: answers are independent of the data size M."""
import sys

sys.path.insert(0, __file__.rsplit("/", 2)[0] + "/jobs")
from _common import emit, session  # noqa: E402

from repro.experiments import run_datasize  # noqa: E402
from repro.experiments.runner import fmt_table  # noqa: E402


def main() -> dict:
    spark = session("datasize")
    res = run_datasize(spark)
    md = fmt_table(
        ["M"] + [str(m) for m in res["M"]],
        [
            ["ISLA"] + [round(x, 4) for x in res["ISLA"]],
            ["m required"] + res["m_required"],
        ],
    )
    emit("datasize", res, md)
    return res


if __name__ == "__main__":
    main()
