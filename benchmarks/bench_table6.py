"""Benchmark + regenerate Table VI (exponential distributions)."""
import pytest

from benchmarks._util import bench_once
from repro.experiments import run_table6


def test_bench_table6(benchmark, spark):
    res = bench_once(benchmark, "table6", run_table6, spark, n=1_000_000)
    for acc, isla, mv in zip(res["Accurate"], res["ISLA"], res["MV"]):
        # Paper shape: MV ≈ 2/γ; ISLA slightly low but closest.
        assert mv == pytest.approx(2 * acc, rel=0.03)
        assert abs(isla - acc) < abs(mv - acc)
        assert abs(isla - acc) < 0.15 * acc
