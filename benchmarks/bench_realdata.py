"""Benchmark + regenerate the §VIII-G (simulated) real-data comparison."""
from benchmarks._util import bench_once
from repro.experiments import run_realdata


def test_bench_realdata(benchmark, spark):
    res = bench_once(benchmark, "realdata", run_realdata, spark)
    for name in ("salary", "tlc"):
        r = res[name]
        # Paper shape: MV grossly overestimates skewed data; ISLA (at
        # half the sample size) stays far closer.
        assert r["MV"] > r["accurate"] * 1.2
        assert abs(r["ISLA"] - r["accurate"]) < abs(r["MV"] - r["accurate"])
