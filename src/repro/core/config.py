"""ISLA parameters (Table I) and confidence-interval math (§III-A).

Defaults follow §VIII "Parameters" where the paper gives values
(e=0.1, β=0.95, λ=0.8, p1=0.5, p2=2.0, η=0.5, q′ bands) and DESIGN.md §2
where it does not (t_e, thr, pilot size, the Case-5 band).
"""
from __future__ import annotations

from dataclasses import dataclass, field, replace
from statistics import NormalDist


def z_score(beta: float) -> float:
    """Two-sided normal quantile ``u`` for confidence ``beta`` (Def. 1).

    For confidence β, the interval is ``mean ± u·σ/√m`` with
    ``u = Φ⁻¹((1+β)/2)``; e.g. ``z_score(0.95) ≈ 1.96``.
    """
    if not 0.0 < beta < 1.0:
        raise ValueError(f"confidence must be in (0, 1), got {beta}")
    return NormalDist().inv_cdf((1.0 + beta) / 2.0)


def required_sample_size(sigma: float, e: float, beta: float) -> int:
    """Eq. (1) sample size ``m = u²σ²/e²`` (at least 1)."""
    if e <= 0:
        raise ValueError(f"desired precision must be positive, got {e}")
    if sigma < 0:
        raise ValueError(f"sigma must be non-negative, got {sigma}")
    u = z_score(beta)
    return max(1, int(round(u * u * sigma * sigma / (e * e))))


@dataclass(frozen=True)
class ISLAConfig:
    """All knobs of the ISLA system, one immutable record.

    Attributes
    ----------
    e : desired precision (half-width of the confidence interval).
    beta : confidence β for the precision assurance.
    eta : convergence speed η — |D| shrinks to η|D| per iteration (§V-D).
    lam : step length factor λ — the shorter step is λ× the longer (§V-D).
    p1, p2 : data boundary parameters (§IV-A1), boundaries at
        ``sketch0 ± p1·σ`` and ``sketch0 ± p2·σ``.
    t_e : relaxed-precision parameter for sketch0 (§III-B); the sketch
        pilot targets precision ``t_e·e`` so its sample is m/t_e².
    thr : iteration threshold — stop when |D| ≤ thr (§V-D). The paper
        gives no default; e/100 makes the residual negligible vs e.
    pilot_n : size of the small pilot set for σ̂ (§III-A); the paper's
        §VIII-G uses 1000.
    dev_case5 : band of dev=|S|/|L| treated as |S| ≈ |L| → return sketch0
        (Case 5). The paper suggests "(0.99, 1.01)".
    dev_q1 : band with no obvious sketch0 deviation → q = 1.
    dev_q5 : band where q′ = 5 (§VIII: (0.94,0.97) ∪ (1.03,1.06));
        outside dev_q1 ∪ dev_q5, q′ = 10.
    clamp_to_sketch_ci : clamp each partial answer to
        ``sketch0 ± t_e·e`` — the §VII-B modulation boundary.
    case3_literal : use the literal §V-C Case-3 reading (both estimators
        move up, extrapolating past the leader). Off by default; see
        DESIGN.md §2.
    max_iters : hard iteration cap (safety; the analytic bound is
        ⌈log2(|D⁰|/thr)⌉ which the defaults keep ≪ this).
    """

    e: float = 0.1
    beta: float = 0.95
    eta: float = 0.5
    lam: float = 0.8
    p1: float = 0.5
    p2: float = 2.0
    t_e: float = 3.0
    thr: float | None = None
    pilot_n: int = 1000
    dev_case5: tuple[float, float] = (0.99, 1.01)
    dev_q1: tuple[float, float] = (0.97, 1.03)
    dev_q5: tuple[float, float] = (0.94, 1.06)
    clamp_to_sketch_ci: bool = True
    case3_literal: bool = False
    max_iters: int = 64

    def __post_init__(self) -> None:
        if self.e <= 0:
            raise ValueError(f"e must be positive, got {self.e}")
        if not 0.0 < self.eta < 1.0:
            raise ValueError(f"eta must be in (0, 1), got {self.eta}")
        if not 0.0 < self.lam < 1.0:
            raise ValueError(f"lam must be in (0, 1), got {self.lam}")
        if not 0.0 < self.p1 < self.p2:
            raise ValueError(
                f"need 0 < p1 < p2, got p1={self.p1}, p2={self.p2}"
            )
        if self.t_e <= 1.0:
            raise ValueError(f"t_e must exceed 1, got {self.t_e}")

    @property
    def z(self) -> float:
        """The confidence quantile u for β."""
        return z_score(self.beta)

    @property
    def threshold(self) -> float:
        """Effective iteration threshold thr (defaults to e/100)."""
        return self.thr if self.thr is not None else self.e / 100.0

    def sample_size(self, sigma: float) -> int:
        """Eq. (1) main-phase sample size for an estimated σ."""
        return required_sample_size(sigma, self.e, self.beta)

    def sketch_sample_size(self, sigma: float) -> int:
        """Sample size for sketch0 at the relaxed precision t_e·e."""
        return required_sample_size(sigma, self.t_e * self.e, self.beta)

    def q_prime(self, dev: float) -> float:
        """q′ from the deviation degree per §VIII "Parameters"."""
        lo1, hi1 = self.dev_q1
        lo5, hi5 = self.dev_q5
        if lo1 < dev < hi1:
            return 1.0
        if lo5 < dev < hi5:
            return 5.0
        return 10.0

    def leverage_allocating_q(self, dev: float) -> float:
        """q from dev (§IV-A4): damp the side that sketch0 over-counts.

        ``|S| > |L|`` (dev > 1) → decrease the S leverage share, q = 1/q′;
        otherwise q = q′.
        """
        qp = self.q_prime(dev)
        if qp == 1.0:
            return 1.0
        return 1.0 / qp if dev > 1.0 else qp

    def with_(self, **kwargs) -> "ISLAConfig":
        """Return a copy with the given fields replaced."""
        return replace(self, **kwargs)
