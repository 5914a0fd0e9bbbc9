"""Benchmark helpers: run an experiment once under pytest-benchmark and
persist its result JSON for EXPERIMENTS.md."""
from __future__ import annotations

import json
import pathlib

OUT = pathlib.Path(__file__).resolve().parent.parent / "experiments_output"


def bench_once(benchmark, name: str, fn, *args, **kwargs) -> dict:
    """Time ``fn`` once (rounds=1 — these are full Spark experiments),
    save the result dict, and return it."""
    result = benchmark.pedantic(fn, args=args, kwargs=kwargs, rounds=1, iterations=1)
    OUT.mkdir(exist_ok=True)
    (OUT / f"{name}.json").write_text(json.dumps(result, indent=2, default=str))
    return result
