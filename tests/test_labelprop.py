"""Tests for label propagation (numpy reference + Spark dataflow impl)."""
import numpy as np
import pandas as pd
import pytest

from repro.graph.knn import knn_graph_np
from repro.graph.labelprop import label_propagation_np, label_propagation_spark
from repro.graph.laplacian import edge_weights


def _two_clusters(seed=0, n=40, d=4):
    g = np.random.default_rng(seed)
    X = np.vstack(
        [
            np.array([3.0] + [0] * (d - 1)) + 0.3 * g.standard_normal((n // 2, d)),
            np.array([-3.0] + [0] * (d - 1)) + 0.3 * g.standard_normal((n // 2, d)),
        ]
    ).astype(np.float32)
    idx, dist = knn_graph_np(X, 4)
    w, _ = edge_weights(dist)
    return X, idx, w


class TestNumpy:
    def test_labels_clamped(self):
        _, idx, w = _two_clusters()
        y = label_propagation_np(idx, w, np.array([0, 20]), np.array([1.0, 0.0]))
        assert y[0] == 1.0 and y[20] == 0.0

    def test_scores_in_unit_interval(self):
        _, idx, w = _two_clusters()
        y = label_propagation_np(idx, w, np.array([0, 20]), np.array([1.0, 0.0]))
        assert ((y >= 0) & (y <= 1)).all()

    def test_propagates_to_cluster(self):
        _, idx, w = _two_clusters()
        n = idx.shape[0]
        y = label_propagation_np(
            idx, w, np.array([0, n // 2]), np.array([1.0, 0.0]), n_iter=50
        )
        assert y[1 : n // 2].mean() > 0.8
        assert y[n // 2 + 1 :].mean() < 0.2

    def test_no_labels_stays_at_prior(self):
        _, idx, w = _two_clusters()
        y = label_propagation_np(idx, w, np.empty(0, int), np.empty(0))
        np.testing.assert_allclose(y, 0.5, atol=1e-9)

    def test_custom_prior(self):
        _, idx, w = _two_clusters()
        n = idx.shape[0]
        prior = np.linspace(0, 1, n)
        y = label_propagation_np(idx, w, np.empty(0, int), np.empty(0), prior=prior, n_iter=0)
        np.testing.assert_allclose(y, prior)


class TestSpark:
    def _edges_df(self, spark, idx, w):
        n, k = idx.shape
        return spark.createDataFrame(
            pd.DataFrame(
                {
                    "src": np.repeat(np.arange(n, dtype=np.int64), k),
                    "dst": idx.ravel().astype(np.int64),
                    "weight": w.ravel().astype(np.float64),
                }
            )
        )

    def test_matches_numpy(self, spark):
        _, idx, w = _two_clusters(1)
        n = idx.shape[0]
        labeled = np.array([0, n // 2])
        labels = np.array([1.0, 0.0])
        sp = (
            label_propagation_spark(
                spark, self._edges_df(spark, idx, w), labeled, labels, n, n_iter=3
            )
            .toPandas()
            .sort_values("id")["score"]
            .to_numpy()
        )
        ref = label_propagation_np(idx, w, labeled, labels, n_iter=3)
        np.testing.assert_allclose(sp, ref, rtol=1e-6, atol=1e-8)

    def test_no_labels(self, spark):
        _, idx, w = _two_clusters(2)
        n = idx.shape[0]
        sp = (
            label_propagation_spark(
                spark, self._edges_df(spark, idx, w), np.empty(0, int), np.empty(0), n, n_iter=1
            )
            .toPandas()["score"]
            .to_numpy()
        )
        np.testing.assert_allclose(sp, 0.5, atol=1e-9)
