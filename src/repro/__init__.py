"""Reproduction of "An Iterative Scheme for Leverage-based Approximate
Aggregation" (ISLA), ICDE 2019.

Public surface:

* :mod:`repro.core` — the ISLA system (pre-estimation, leverage strategy,
  iterative modulation, summarisation).
* :mod:`repro.baselines` — US / STS / MV / MVB comparators.
* :mod:`repro.experiments` — one runner per evaluation table.
* :mod:`repro.synth_data` — deterministic synthetic data generators.
* :mod:`repro.oracle` — DuckDB result-equality checker.
"""

__version__ = "0.1.0"
