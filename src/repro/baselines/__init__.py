"""Baselines the paper evaluates against (§VIII).

* :mod:`repro.baselines.uniform` — US, plain uniform sampling.
* :mod:`repro.baselines.stratified` — STS, stratified by block.
* :mod:`repro.baselines.measure_biased` — MV and MVB, the sample+seek
  measure-biased technique re-weighted per §VIII-C.
"""

from repro.baselines.uniform import uniform_avg
from repro.baselines.stratified import stratified_avg
from repro.baselines.measure_biased import mv_avg, mvb_avg

__all__ = ["uniform_avg", "stratified_avg", "mv_avg", "mvb_avg"]
