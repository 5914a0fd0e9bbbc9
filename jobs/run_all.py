"""Run every evaluation experiment and print all paper tables.

Usage: spark-submit jobs/run_all.py [--small]
(--small shrinks n for a quick smoke run.)
"""
import sys

sys.path.insert(0, __file__.rsplit("/", 2)[0] + "/jobs")
import run_datasize  # noqa: E402
import run_efficiency  # noqa: E402
import run_noniid  # noqa: E402
import run_realdata  # noqa: E402
import run_table3  # noqa: E402
import run_table4  # noqa: E402
import run_table5  # noqa: E402
import run_table6  # noqa: E402
import run_table7  # noqa: E402


def main() -> None:
    small = "--small" in sys.argv
    n = 120_000 if small else 1_000_000
    run_table3.main(n=n)
    run_table4.main(n=n)
    run_table5.main(n=n)
    run_table6.main(n=n)
    run_table7.main(n=n)
    run_noniid.main(n_per_block=20_000 if small else 200_000)
    run_datasize.main()
    run_efficiency.main()
    run_realdata.main()


if __name__ == "__main__":
    main()
