"""Unit tests for the from-scratch L-BFGS optimizer."""
import numpy as np
import pytest

from repro.core import lbfgs
from repro.core.loss import l1_loss_grad, l3_loss_grad


def quad(A, b):
    def fg(x):
        return 0.5 * x @ A @ x - b @ x, A @ x - b

    return fg


class TestQuadratics:
    @pytest.mark.parametrize("seed", range(6))
    @pytest.mark.parametrize("d", [2, 8, 32])
    def test_converges_to_solution(self, seed, d):
        g = np.random.default_rng(seed)
        R = g.standard_normal((d, d))
        A = R @ R.T + np.eye(d)
        b = g.standard_normal(d)
        res = lbfgs.minimize(
            quad(A, b), np.zeros(d), max_iter=500, ftol=1e-14, gtol=1e-8
        )
        np.testing.assert_allclose(res.x, np.linalg.solve(A, b), rtol=1e-4, atol=1e-5)

    def test_identity_one_step_solvable(self):
        res = lbfgs.minimize(quad(np.eye(3), np.array([1.0, 2.0, 3.0])), np.zeros(3))
        np.testing.assert_allclose(res.x, [1, 2, 3], atol=1e-5)
        assert res.converged

    def test_ill_conditioned(self):
        A = np.diag([1.0, 100.0, 10000.0])
        b = np.ones(3)
        res = lbfgs.minimize(quad(A, b), np.zeros(3), max_iter=300)
        np.testing.assert_allclose(res.x, b / np.diag(A), rtol=1e-3, atol=1e-6)


class TestRosenbrock:
    def test_rosenbrock_2d(self):
        def fg(x):
            a, b = 1.0, 100.0
            f = (a - x[0]) ** 2 + b * (x[1] - x[0] ** 2) ** 2
            g = np.array(
                [
                    -2 * (a - x[0]) - 4 * b * x[0] * (x[1] - x[0] ** 2),
                    2 * b * (x[1] - x[0] ** 2),
                ]
            )
            return f, g

        res = lbfgs.minimize(fg, np.array([-1.2, 1.0]), max_iter=500, ftol=1e-14)
        np.testing.assert_allclose(res.x, [1.0, 1.0], atol=1e-3)


class TestLogisticFit:
    @pytest.mark.parametrize("seed", range(4))
    def test_recovers_separating_direction(self, seed):
        g = np.random.default_rng(seed)
        d = 6
        true_w = g.standard_normal(d)
        true_w /= np.linalg.norm(true_w)
        X = g.standard_normal((200, d))
        y = (X @ true_w > 0).astype(float)
        res = lbfgs.minimize(
            lambda w: l1_loss_grad(w, X, y, 0.1), np.zeros(d), max_iter=300
        )
        cos = res.x @ true_w / np.linalg.norm(res.x)
        assert cos > 0.95

    def test_seesaw_loss_runs_fast(self):
        g = np.random.default_rng(0)
        d, n = 64, 60
        X = g.standard_normal((n, d))
        y = (g.random(n) > 0.7).astype(float)
        q0 = g.standard_normal(d)
        q0 /= np.linalg.norm(q0)
        M = np.eye(d) * 0.03
        res = lbfgs.minimize(
            lambda w: l3_loss_grad(w, X, y, q0, M, 1.0, 0.6, 2.0),
            q0,
            max_iter=100,
        )
        assert res.n_iter <= 100
        assert np.isfinite(res.fun)


class TestRobustness:
    def test_starts_at_optimum(self):
        res = lbfgs.minimize(quad(np.eye(2), np.zeros(2)), np.zeros(2))
        assert res.converged
        np.testing.assert_allclose(res.x, np.zeros(2))

    def test_max_iter_respected(self):
        A = np.diag([1.0, 1000.0])
        res = lbfgs.minimize(quad(A, np.ones(2)), np.zeros(2), max_iter=2)
        assert res.n_iter <= 2

    def test_result_monotone_improvement(self):
        g = np.random.default_rng(1)
        A = np.eye(5) * 2
        b = g.standard_normal(5)
        fg = quad(A, b)
        x0 = g.standard_normal(5) * 10
        res = lbfgs.minimize(fg, x0, max_iter=50)
        assert res.fun <= fg(x0)[0]
