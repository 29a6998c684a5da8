"""Loss functions L1/L2/L3 from the paper (Equations 1-3) with gradients.

All losses are functions of the query-vector parameter ``w`` (shape (d,)):

- ``L1`` (Eq. 1, *few-shot CLIP*): logistic loss over user feedback plus an
  L2 ridge penalty ``lam * |w|^2``. Per §3.2 the bias term is dropped (the
  paper found fitting ``b`` hurts the learned query), so the logit is just
  ``w.x``.
- ``L2`` (Eq. 2, *CLIP alignment*): L1 plus ``lam_c * (1 - w.q0/|w|)`` — a
  cosine pull toward the original CLIP text query ``q0``.
- ``L3`` (Eq. 3, *DB alignment*): L2 plus ``lam_d * (w^T M_D w)/|w|^2`` — a
  quadratic-over-norm penalty derived from the database kNN-graph Laplacian,
  pointing ``w`` toward the center of dense regions.

Gradients are analytic; ``tests/test_loss.py`` checks them against finite
differences (including via hypothesis-generated inputs).
"""
from __future__ import annotations

import numpy as np

_EPS = 1e-12


def log1pexp(z: np.ndarray) -> np.ndarray:
    """Numerically stable ``log(1 + exp(z))``."""
    out = np.empty_like(z, dtype=np.float64)
    pos = z > 0
    out[pos] = z[pos] + np.log1p(np.exp(-z[pos]))
    out[~pos] = np.log1p(np.exp(z[~pos]))
    return out


def sigmoid(z: np.ndarray) -> np.ndarray:
    """Numerically stable logistic function."""
    out = np.empty_like(z, dtype=np.float64)
    pos = z >= 0
    out[pos] = 1.0 / (1.0 + np.exp(-z[pos]))
    ez = np.exp(z[~pos])
    out[~pos] = ez / (1.0 + ez)
    return out


def logistic_loss_grad(
    w: np.ndarray, X: np.ndarray, y: np.ndarray, sample_weight: np.ndarray | None = None
) -> tuple[float, np.ndarray]:
    """Sum of logistic losses ``log(1+exp(-s_i w.x_i))`` with s_i = ±1.

    ``y`` holds {0,1} labels; ``sample_weight`` optionally re-weights each
    example (used to balance scarce positives against many negatives).
    Returns ``(loss, grad)``.
    """
    if X.shape[0] == 0:
        return 0.0, np.zeros_like(w)
    s = np.where(np.asarray(y, dtype=np.float64) > 0.5, 1.0, -1.0)
    z = X @ w
    per = log1pexp(-s * z)
    # d/dw log(1+exp(-s z)) = -s * sigmoid(-s z) * x
    coef = -s * sigmoid(-s * z)
    if sample_weight is not None:
        per = per * sample_weight
        coef = coef * sample_weight
    return float(per.sum()), X.T @ coef


def l1_loss_grad(
    w: np.ndarray,
    X: np.ndarray,
    y: np.ndarray,
    lam: float,
    sample_weight: np.ndarray | None = None,
) -> tuple[float, np.ndarray]:
    """Equation 1: logistic loss + ridge penalty (no bias term)."""
    f, g = logistic_loss_grad(w, X, y, sample_weight)
    f += lam * float(w @ w)
    g = g + 2.0 * lam * w
    return f, g


def cos_penalty_grad(w: np.ndarray, q0: np.ndarray) -> tuple[float, np.ndarray]:
    """CLIP-alignment term ``1 - w.q0/|w|`` and its gradient.

    ``q0`` is assumed unit-norm (the CLIP text embedding is normalized).
    """
    nw = float(np.linalg.norm(w))
    if nw < _EPS:
        # At w=0 the cosine is undefined; treat penalty as its max (1) with
        # a pull along -q0 so the optimizer escapes the origin toward q0.
        return 1.0, -q0.copy()
    dot = float(w @ q0)
    f = 1.0 - dot / nw
    g = -(q0 / nw) + dot * w / nw**3
    return f, g


def quad_over_norm_grad(w: np.ndarray, M: np.ndarray) -> tuple[float, np.ndarray]:
    """DB-alignment term ``(w^T M w)/|w|^2`` and its gradient (M symmetric)."""
    n2 = float(w @ w)
    if n2 < _EPS:
        return 0.0, np.zeros_like(w)
    Mw = M @ w
    q = float(w @ Mw)
    f = q / n2
    g = 2.0 * Mw / n2 - 2.0 * q * w / n2**2
    return f, g


def l3_loss_grad(
    w: np.ndarray,
    X: np.ndarray,
    y: np.ndarray,
    q0: np.ndarray,
    M: np.ndarray | None,
    lam: float,
    lam_c: float,
    lam_d: float,
    sample_weight: np.ndarray | None = None,
) -> tuple[float, np.ndarray]:
    """Equation 3 (the full SeeSaw loss). ``M=None`` or ``lam_d=0`` reduces to
    Eq. 2; additionally ``lam_c=0`` reduces to Eq. 1."""
    f, g = l1_loss_grad(w, X, y, lam, sample_weight)
    if lam_c != 0.0:
        fc, gc = cos_penalty_grad(w, q0)
        f += lam_c * fc
        g = g + lam_c * gc
    if lam_d != 0.0 and M is not None:
        fd, gd = quad_over_norm_grad(w, M)
        f += lam_d * fd
        g = g + lam_d * gd
    return f, g
