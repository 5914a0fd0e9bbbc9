"""Phase-2 modulation tests: cases, step lengths, convergence, clamping."""
import math

import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core.config import ISLAConfig
from repro.core.iteration import (
    classify_case,
    iteration_upper_bound,
    modulate_block,
)
from repro.core.leverage import theorem3_kc
from repro.core.moments import RegionMoments


def moments_for(xs, ys):
    return RegionMoments.from_values(xs), RegionMoments.from_values(ys)


def synthetic_moments(u, v, mean_s=80.0, mean_l=120.0):
    """Region moments for u S-samples around mean_s and v L-samples
    around mean_l (small spread, deterministic)."""
    xs = [mean_s + 0.1 * (i % 7 - 3) for i in range(u)]
    ys = [mean_l + 0.1 * (i % 5 - 2) for i in range(v)]
    return moments_for(xs, ys)


CFG = ISLAConfig(e=0.1)


class TestCaseClassification:
    @pytest.mark.parametrize(
        "d0,u,v,case",
        [
            (-1.0, 10, 20, 1),
            (-1.0, 20, 10, 2),
            (1.0, 10, 20, 3),
            (1.0, 20, 10, 4),
        ],
    )
    def test_cases(self, d0, u, v, case):
        assert classify_case(d0, u, v) == case


class TestIterationBound:
    @pytest.mark.parametrize(
        "d0,thr,expected",
        [
            (1.0, 0.001, 10),   # ⌈log2(1000)⌉
            (0.5, 0.001, 9),
            (1.0, 1.0, 0),
            (0.0009, 0.001, 0),
            (8.0, 1.0, 3),
        ],
    )
    def test_bound_formula(self, d0, thr, expected):
        assert iteration_upper_bound(d0, thr) == expected

    @given(
        st.floats(min_value=1e-3, max_value=1e3),
        st.floats(min_value=1e-4, max_value=1.0),
    )
    @settings(max_examples=100, deadline=None)
    def test_geometric_halving_respects_bound(self, d0, thr):
        t = iteration_upper_bound(d0, thr)
        assert d0 * 0.5**t <= thr * (1 + 1e-9)
        if t > 0:
            assert d0 * 0.5 ** (t - 1) > thr * (1 - 1e-9)


class TestCase5:
    def test_balanced_regions_return_sketch0(self):
        m_s, m_l = synthetic_moments(1000, 1000)
        ans = modulate_block(m_s, m_l, 101.5, CFG)
        assert ans.case == 5
        assert ans.partial == 101.5
        assert ans.iters == 0

    @pytest.mark.parametrize("u,v", [(995, 1000), (1000, 995)])
    def test_band_edges(self, u, v):
        # dev = 0.995 / 1.00503 — inside (0.99, 1.01).
        m_s, m_l = synthetic_moments(u, v)
        assert modulate_block(m_s, m_l, 100.0, CFG).case == 5

    @pytest.mark.parametrize("u,v", [(0, 100), (100, 0), (0, 0)])
    def test_empty_region_falls_back_to_sketch(self, u, v):
        m_s, m_l = synthetic_moments(max(u, 1), max(v, 1))
        if u == 0:
            m_s = RegionMoments.empty()
        if v == 0:
            m_l = RegionMoments.empty()
        ans = modulate_block(m_s, m_l, 99.0, CFG)
        assert ans.partial == 99.0
        assert ans.case == 5


class TestInteriorMeeting:
    """Cases 2/3 converge to (c + λ·sketch0)/(1+λ) (DESIGN.md §2)."""

    def _run(self, u, v, sketch0, cfg=CFG):
        m_s, m_l = synthetic_moments(u, v)
        k, c = theorem3_kc(m_s, m_l, cfg.leverage_allocating_q(u / v))
        ans = modulate_block(m_s, m_l, sketch0, cfg.with_(clamp_to_sketch_ci=False))
        return ans, c

    def test_case2_meets_lambda_weighted_point(self):
        # |S| > |L| and c < sketch0 → Case 2.
        ans, c = self._run(1100, 1000, sketch0=110.0)
        assert ans.case == 2
        want = (c + CFG.lam * 110.0) / (1 + CFG.lam)
        # Residual |D| ≤ thr remains; tolerance is the leftover step mass.
        assert ans.partial == pytest.approx(want, abs=CFG.threshold)

    def test_case3_meets_lambda_weighted_point(self):
        # |S| < |L| and c > sketch0 → Case 3.
        ans, c = self._run(1000, 1100, sketch0=90.0)
        assert ans.case == 3
        want = (c + CFG.lam * 90.0) / (1 + CFG.lam)
        assert ans.partial == pytest.approx(want, abs=CFG.threshold)

    @given(
        st.floats(min_value=95.0, max_value=99.0),
        st.sampled_from([0.2, 0.5, 0.8]),
    )
    @settings(max_examples=50, deadline=None)
    def test_case3_answer_between_estimators(self, sketch0, lam):
        cfg = CFG.with_(lam=lam, clamp_to_sketch_ci=False)
        m_s, m_l = synthetic_moments(1000, 1150)
        _, c = theorem3_kc(m_s, m_l, 1.0)
        ans = modulate_block(m_s, m_l, sketch0, cfg)
        assert ans.case == 3
        assert sketch0 - 1e-9 <= ans.partial <= c + 1e-9

    def test_alpha_recovers_partial(self):
        """avg = kα + c must hold for the reported α (Alg. 2 line 12)."""
        m_s, m_l = synthetic_moments(1000, 1150)
        ans = modulate_block(m_s, m_l, 95.0, CFG.with_(clamp_to_sketch_ci=False))
        assert ans.k * ans.alpha + ans.c == pytest.approx(ans.partial, abs=1e-9)

    def test_iters_within_upper_bound(self):
        m_s, m_l = synthetic_moments(1000, 1150)
        ans = modulate_block(m_s, m_l, 95.0, CFG.with_(clamp_to_sketch_ci=False))
        assert 0 < ans.iters <= iteration_upper_bound(ans.d0, CFG.threshold) \
            <= CFG.max_iters


class TestUnbalancedCases:
    """Cases 1/4 extrapolate past sketch0, toward μ."""

    def test_case1_extrapolates_above_sketch0(self):
        # |S| < |L| (μ above sketch0) yet c < sketch0: unbalanced.
        m_s, m_l = synthetic_moments(1000, 1300, mean_s=70.0, mean_l=110.0)
        _, c = theorem3_kc(m_s, m_l, 1.0)
        sketch0 = c + 0.05  # slightly above c → D0 < 0
        cfg = CFG.with_(clamp_to_sketch_ci=False)
        ans = modulate_block(m_s, m_l, sketch0, cfg)
        assert ans.case == 1
        assert ans.partial > sketch0

    def test_case4_extrapolates_below_sketch0(self):
        m_s, m_l = synthetic_moments(1300, 1000, mean_s=90.0, mean_l=130.0)
        _, c = theorem3_kc(m_s, m_l, 1.0)
        sketch0 = c - 0.05  # slightly below c → D0 > 0
        cfg = CFG.with_(clamp_to_sketch_ci=False)
        ans = modulate_block(m_s, m_l, sketch0, cfg)
        assert ans.case == 4
        assert ans.partial < sketch0

    def test_case4_alpha_negative(self):
        # §V-C Case 4: "α is negative to balance such unbalanced sampling"
        # (when k > 0; in general sign(α) = −sign(k) here since t < 0).
        m_s, m_l = synthetic_moments(1300, 1000, mean_s=90.0, mean_l=130.0)
        _, c = theorem3_kc(m_s, m_l, 1.0)
        ans = modulate_block(m_s, m_l, c - 0.05, CFG.with_(clamp_to_sketch_ci=False))
        assert ans.alpha * ans.k < 0  # t = kα is negative


class TestClamp:
    def test_clamp_limits_to_sketch_ci(self):
        """§VII-B: answers cannot leave sketch0 ± t_e·e."""
        m_s, m_l = synthetic_moments(1000, 2000, mean_s=60.0, mean_l=150.0)
        sketch0 = 80.0
        ans = modulate_block(m_s, m_l, sketch0, CFG)
        radius = CFG.t_e * CFG.e
        assert sketch0 - radius - 1e-12 <= ans.partial <= sketch0 + radius + 1e-12

    def test_clamp_flag_reported(self):
        m_s, m_l = synthetic_moments(1000, 2000, mean_s=60.0, mean_l=150.0)
        ans = modulate_block(m_s, m_l, 80.0, CFG)
        unclamped = modulate_block(
            m_s, m_l, 80.0, CFG.with_(clamp_to_sketch_ci=False)
        )
        if abs(unclamped.partial - 80.0) > CFG.t_e * CFG.e:
            assert ans.clamped and not unclamped.clamped

    def test_interior_answers_not_clamped(self):
        m_s, m_l = synthetic_moments(1100, 1000)
        _, c = theorem3_kc(m_s, m_l, CFG.leverage_allocating_q(1.1))
        ans = modulate_block(m_s, m_l, c + 0.1, CFG)
        assert not ans.clamped


class TestLiteralCase3:
    def test_literal_mode_extrapolates_past_c(self):
        """§V-C verbatim Case 3: both up ⇒ meeting point beyond c by
        (λ/(1−λ))·D⁰ — the amplification DESIGN.md §2 documents."""
        cfg = CFG.with_(case3_literal=True, clamp_to_sketch_ci=False)
        m_s, m_l = synthetic_moments(1000, 1150)
        _, c = theorem3_kc(m_s, m_l, cfg.leverage_allocating_q(1000 / 1150))
        sketch0 = c - 0.2
        ans = modulate_block(m_s, m_l, sketch0, cfg)
        assert ans.case == 3
        d0 = c - sketch0
        want = c + (cfg.lam / (1 - cfg.lam)) * d0
        assert ans.partial == pytest.approx(want, abs=5 * CFG.threshold)
        assert ans.partial > c

    def test_literal_mode_is_clamped_by_default_config(self):
        cfg = CFG.with_(case3_literal=True)
        m_s, m_l = synthetic_moments(1000, 1150)
        _, c = theorem3_kc(m_s, m_l, cfg.leverage_allocating_q(1000 / 1150))
        ans = modulate_block(m_s, m_l, c - 0.2, cfg)
        assert ans.partial <= (c - 0.2) + cfg.t_e * cfg.e + 1e-12


def test_literal_cumulative_reading_is_inconsistent():
    """DESIGN.md §2: applying §V-D's λ relation to the *cumulative* kα
    against the per-iteration δsketch yields a negative sketch step from
    iteration 2 on — the reading is unimplementable, which is why the
    per-iteration reading is used."""
    lam, eta, d0 = 0.8, 0.5, 1.0
    # Iteration 1 (identical under both readings): t1 = λ·s1.
    s1 = (1 - eta) * d0 / (1 - lam)
    t1 = lam * s1
    d1 = eta * d0
    # Iteration 2, cumulative reading: t2 = λ(s2 − s1) and
    # t2 + d0 − s2 = η·d1 ⇒ s2 = (η·d1 − d0 + λ·s1)/(λ − 1), which is
    # negative for λ=0.8 — the cumulative sketch position would jump
    # *below* its starting point although Case 3 requires increasing it.
    s2 = (eta * d1 - d0 + lam * s1) / (lam - 1)
    assert s2 < 0 < s1
