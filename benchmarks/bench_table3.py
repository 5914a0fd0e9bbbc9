"""Benchmark + regenerate Table III (accuracy: ISLA vs MV vs MVB)."""
import pytest

from benchmarks._util import bench_once
from repro.experiments import run_table3


def test_bench_table3(benchmark, spark):
    res = bench_once(benchmark, "table3", run_table3, spark, n=1_000_000)
    # Paper shape: ISLA within ~e of 100; MV carries the ≈+4 bias.
    assert abs(res["ISLA_avg"] - 100.0) < 0.15
    assert res["MV_avg"] == pytest.approx(104.0, abs=0.5)
    assert abs(res["MVB_avg"] - 100.0) < abs(res["MV_avg"] - 100.0)
