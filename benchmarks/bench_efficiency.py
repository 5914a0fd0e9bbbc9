"""Benchmark + regenerate the §VIII-F efficiency run on LINEITEM."""
import pytest

from benchmarks._util import bench_once
from repro.experiments import run_efficiency


def test_bench_efficiency(benchmark, spark):
    res = bench_once(
        benchmark, "efficiency", run_efficiency, spark, sf=0.1, repeats=3
    )
    times = res["time_ms"]
    # Paper shape: US is the cheapest; ISLA costs only modestly more
    # (extra pilot passes) and far less than running exact aggregation —
    # absolute orderings among MV/MVB/STS are testbed-specific, so only
    # the US ≤ ISLA relation and positivity are asserted.
    assert times["US"] <= times["ISLA"]
    assert all(t > 0 for t in times.values())
    assert res["answers"]["US"] == pytest.approx(res["accurate"], rel=0.05)
