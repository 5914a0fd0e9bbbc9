"""Benchmark + regenerate Table VII (uniform distributions)."""
import pytest

from benchmarks._util import bench_once
from repro.experiments import run_table7


def test_bench_table7(benchmark, spark):
    res = bench_once(benchmark, "table7", run_table7, spark, n=1_000_000)
    for isla, mv, mvb in zip(res["ISLA"], res["MV"], res["MVB"]):
        # Paper shape: MV ≈ 132, ISLA far more robust than both.
        assert mv == pytest.approx(132.7, abs=1.0)
        assert abs(isla - 100.0) < abs(mv - 100.0)
        assert abs(isla - 100.0) < 1.0
