"""Tests for the QueryAligner (solving Eq. 5) and its limiting behaviours."""
import numpy as np
import pytest

from repro.core.aligner import AlignerParams, QueryAligner


def _problem(seed=0, d=16, n=12):
    g = np.random.default_rng(seed)
    q0 = g.standard_normal(d)
    q0 /= np.linalg.norm(q0)
    target = g.standard_normal(d)
    target /= np.linalg.norm(target)
    X = np.vstack(
        [
            target + 0.2 * g.standard_normal((n // 2, d)),
            -target + 0.2 * g.standard_normal((n - n // 2, d)),
        ]
    )
    y = np.array([1.0] * (n // 2) + [0.0] * (n - n // 2))
    return q0, target, X, y


class TestBasics:
    def test_no_feedback_returns_q0(self):
        q0, _, _, _ = _problem()
        a = QueryAligner(AlignerParams())
        out = a.align(q0, np.zeros((0, q0.size)), np.zeros(0))
        np.testing.assert_allclose(out, q0)

    @pytest.mark.parametrize("seed", range(5))
    def test_output_unit_norm(self, seed):
        q0, _, X, y = _problem(seed)
        out = QueryAligner(AlignerParams()).align(q0, X, y)
        assert np.linalg.norm(out) == pytest.approx(1.0, abs=1e-9)

    def test_deterministic(self):
        q0, _, X, y = _problem(3)
        a1 = QueryAligner(AlignerParams()).align(q0, X, y)
        a2 = QueryAligner(AlignerParams()).align(q0, X, y)
        np.testing.assert_array_equal(a1, a2)

    def test_shape_mismatch_raises(self):
        q0, _, X, y = _problem()
        with pytest.raises(ValueError):
            QueryAligner().align(q0, X, y[:-1])

    def test_bad_m_shape_raises(self):
        with pytest.raises(ValueError):
            QueryAligner(M=np.ones((3, 4)))


class TestLimits:
    def test_huge_lam_c_pins_to_q0(self):
        q0, _, X, y = _problem(1)
        out = QueryAligner(AlignerParams(lam=100, lam_c=1e7, lam_d=0)).align(q0, X, y)
        assert out @ q0 > 0.999

    def test_zero_lam_c_tracks_data(self):
        q0, target, X, y = _problem(2)
        out = QueryAligner(
            AlignerParams(lam=10, lam_c=0, lam_d=0), balanced=False
        ).align(q0, X, y)
        assert out @ target > 0.9

    def test_moderate_lam_c_blends(self):
        q0, target, X, y = _problem(4)
        pure = QueryAligner(AlignerParams(lam=10, lam_c=0, lam_d=0)).align(q0, X, y)
        blend = QueryAligner(AlignerParams(lam=10, lam_c=50, lam_d=0)).align(q0, X, y)
        # blended vector is closer to q0 than the data-only fit
        assert blend @ q0 > pure @ q0

    def test_db_align_pulls_to_low_quad_direction(self):
        d = 8
        g = np.random.default_rng(5)
        q0 = np.zeros(d)
        q0[0] = 1.0
        # M strongly penalizes dim 0, leaves dim 1 free
        M = np.eye(d)
        M[0, 0] = 50.0
        M[1, 1] = 0.0
        X = g.standard_normal((6, d)) * 0.01  # negligible data signal
        y = np.array([1.0, 0, 0, 1, 0, 0])
        out = QueryAligner(AlignerParams(lam=100, lam_c=1, lam_d=5000), M=M).align(
            q0, X, y
        )
        # strong DB-align moves mass off the penalized dim 0
        assert abs(out[0]) < 0.9


class TestBalancing:
    def test_balanced_upweights_lone_positive(self):
        g = np.random.default_rng(7)
        d = 8
        q0 = g.standard_normal(d)
        q0 /= np.linalg.norm(q0)
        pos_dir = np.zeros(d)
        pos_dir[2] = 1.0
        X = np.vstack([pos_dir, g.standard_normal((20, d)) * 0.5])
        y = np.array([1.0] + [0.0] * 20)
        bal = QueryAligner(AlignerParams(lam=10, lam_c=1, lam_d=0), balanced=True).align(q0, X, y)
        unb = QueryAligner(AlignerParams(lam=10, lam_c=1, lam_d=0), balanced=False).align(q0, X, y)
        assert bal @ pos_dir > unb @ pos_dir

    def test_cap_between_extremes(self):
        g = np.random.default_rng(8)
        d = 8
        q0 = g.standard_normal(d)
        q0 /= np.linalg.norm(q0)
        pos_dir = np.zeros(d)
        pos_dir[1] = 1.0
        X = np.vstack([pos_dir, g.standard_normal((30, d)) * 0.5])
        y = np.array([1.0] + [0.0] * 30)
        lo = QueryAligner(AlignerParams(lam=10, lam_c=1, lam_d=0), balanced=False).align(q0, X, y) @ pos_dir
        hi = QueryAligner(AlignerParams(lam=10, lam_c=1, lam_d=0), balanced=True).align(q0, X, y) @ pos_dir
        mid = QueryAligner(AlignerParams(lam=10, lam_c=1, lam_d=0), balanced=3.0).align(q0, X, y) @ pos_dir
        assert lo - 1e-6 <= mid <= hi + 1e-6


class TestParams:
    def test_effective_units(self):
        p = AlignerParams(lam=100, lam_c=10, lam_d=1000)
        from repro.core.aligner import COS_UNIT, QUAD_UNIT, RIDGE_UNIT

        assert p.lam_eff == pytest.approx(100 * RIDGE_UNIT)
        assert p.lam_c_eff == pytest.approx(10 * COS_UNIT)
        assert p.lam_d_eff == pytest.approx(1000 * QUAD_UNIT)

    def test_frozen(self):
        p = AlignerParams()
        with pytest.raises(Exception):
            p.lam = 5
