"""Tests for Rocchio's algorithm (Eq. 6)."""
import numpy as np
import pytest

from repro.baselines import RocchioRanker
from repro.embed.clipsim import WorldSpec, generate_world

DS = generate_world(WorldSpec(n_images=60, n_categories=4, d=8, grid=(0, 0), seed=2))


def _reset(r=None):
    r = r or RocchioRanker()
    q0 = DS.query_vecs[0].astype(np.float64)
    r.reset(DS, q0)
    return r, q0


class TestFormula:
    def test_initial_query_is_q0(self):
        r, q0 = _reset()
        s = r.vector_scores(60)
        np.testing.assert_allclose(s, DS.vectors @ q0.astype(np.float32), atol=1e-6)

    def test_update_matches_equation6(self):
        r, q0 = _reset()
        pos_ids = np.array([3, 7])
        neg_ids = np.array([1, 2, 5])
        r.observe(0, True, pos_ids, np.empty(0, dtype=int))
        r.observe(1, False, np.empty(0, dtype=int), neg_ids)
        expect = (
            1.0 * q0
            + 0.5 * DS.vectors[pos_ids].astype(np.float64).mean(axis=0)
            - 0.25 * DS.vectors[neg_ids].astype(np.float64).mean(axis=0)
        )
        expect /= np.linalg.norm(expect)
        np.testing.assert_allclose(r._q, expect, atol=1e-9)

    def test_only_negatives_drops_positive_term(self):
        r, q0 = _reset()
        neg_ids = np.array([4, 6])
        r.observe(0, False, np.empty(0, dtype=int), neg_ids)
        expect = q0 - 0.25 * DS.vectors[neg_ids].astype(np.float64).mean(axis=0)
        expect /= np.linalg.norm(expect)
        np.testing.assert_allclose(r._q, expect, atol=1e-9)

    def test_only_positives_drops_negative_term(self):
        r, q0 = _reset()
        pos_ids = np.array([9])
        r.observe(0, True, pos_ids, np.empty(0, dtype=int))
        expect = q0 + 0.5 * DS.vectors[pos_ids].astype(np.float64).mean(axis=0)
        expect /= np.linalg.norm(expect)
        np.testing.assert_allclose(r._q, expect, atol=1e-9)

    def test_query_stays_unit_norm(self):
        r, _ = _reset()
        g = np.random.default_rng(0)
        for i in range(10):
            ids = np.array([g.integers(0, DS.n_vectors)])
            r.observe(i, i % 2 == 0, ids if i % 2 == 0 else np.empty(0, int),
                      np.empty(0, int) if i % 2 == 0 else ids)
            assert np.linalg.norm(r._q) == pytest.approx(1.0, abs=1e-9)

    def test_custom_hyperparameters(self):
        r = RocchioRanker(alpha=2.0, beta=1.0, gamma=0.0)
        r, q0 = _reset(r)
        pos_ids = np.array([0])
        neg_ids = np.array([1])
        r.observe(0, True, pos_ids, neg_ids)
        expect = 2.0 * q0 + 1.0 * DS.vectors[pos_ids].astype(np.float64).mean(axis=0)
        # gamma=0: negatives contribute nothing
        expect /= np.linalg.norm(expect)
        np.testing.assert_allclose(r._q, expect, atol=1e-9)

    def test_reset_clears_state(self):
        r, q0 = _reset()
        r.observe(0, True, np.array([3]), np.empty(0, int))
        r.reset(DS, q0)
        s = r.vector_scores(60)
        np.testing.assert_allclose(s, DS.vectors @ q0.astype(np.float32), atol=1e-6)
