"""Benchmark + regenerate the §VIII-D non-i.i.d. experiment."""
from benchmarks._util import bench_once
from repro.experiments import run_noniid


def test_bench_noniid(benchmark, spark):
    res = bench_once(benchmark, "noniid", run_noniid, spark, n_per_block=200_000)
    # Paper shape: runs land around the accurate 100 within ≈ e=0.5
    # (assert 2e per run; the estimator std at this rate is ≈ e/2).
    for ans in res["ISLA"]:
        assert abs(ans - 100.0) < 1.0
