"""Benchmark + regenerate Table IV (per-block modulation abilities)."""
import pytest

from benchmarks._util import bench_once
from repro.experiments import run_table4


def test_bench_table4(benchmark, spark):
    res = bench_once(benchmark, "table4", run_table4, spark, n=1_000_000)
    isla_avg = sum(res["ISLA"]) / len(res["ISLA"])
    mv_avg = sum(res["MV"]) / len(res["MV"])
    # Paper shape: ISLA partials modulate sketch0 toward μ; MV ≈ 104.
    assert abs(isla_avg - 100.0) < 0.2
    assert mv_avg == pytest.approx(104.0, abs=0.6)
    # Each partial is bounded by the sketch CI clamp (t_e·e = 0.3) plus
    # sketch0's own relaxed-precision error.
    for p in res["ISLA"]:
        assert abs(p - 100.0) < 0.8
