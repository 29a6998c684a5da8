"""Tests for the approximate IVF index (the Annoy stand-in)."""
import numpy as np
import pytest

from repro.embed.clipsim import WorldSpec, generate_world
from repro.store.ivf import IvfIndex
from repro.store.scan import topk_vectors

DS = generate_world(WorldSpec(n_images=120, n_categories=4, d=8, grid=(0, 0), seed=8))


@pytest.fixture(scope="module")
def index(spark):
    df = DS.to_vector_df(spark).cache()
    df.count()
    return IvfIndex.build(spark, df, n_cells=8, n_iter=3), df


class TestBuild:
    def test_centroid_shape(self, index):
        idx, _ = index
        assert idx.centroids.shape == (8, 8)

    def test_every_vector_assigned(self, index):
        idx, _ = index
        pdf = idx.df.toPandas()
        assert len(pdf) == DS.n_vectors
        assert pdf["cell"].between(0, 7).all()

    def test_too_many_cells_raises(self, spark):
        tiny = generate_world(WorldSpec(n_images=4, n_categories=2, d=4, grid=(0, 0), seed=1))
        with pytest.raises(ValueError):
            IvfIndex.build(spark, tiny.to_vector_df(spark), n_cells=10)

    def test_assignment_is_nearest_centroid(self, index):
        idx, _ = index
        pdf = idx.df.toPandas().sort_values("vec_id")
        vecs = np.stack(pdf["vector"].to_numpy())
        d2 = ((vecs[:, None, :] - idx.centroids[None, :, :]) ** 2).sum(axis=2)
        np.testing.assert_array_equal(pdf["cell"].to_numpy(), np.argmin(d2, axis=1))


class TestSearch:
    def test_full_probe_equals_exact(self, index):
        idx, df = index
        q = DS.query_vecs[0].astype(np.float64)
        approx = idx.search(q, 10, nprobe=8).toPandas()
        exact = topk_vectors(df, q, 10).toPandas()
        np.testing.assert_allclose(
            np.sort(approx["score"]), np.sort(exact["score"]), atol=1e-9
        )

    @pytest.mark.parametrize("cat", range(4))
    def test_recall_reasonable(self, index, cat):
        """Approximate search keeps most of the exact top-10 (the paper saw
        'only a minor drop' with Annoy)."""
        idx, df = index
        q = DS.query_vecs[cat].astype(np.float64)
        approx = set(idx.search(q, 10, nprobe=3).toPandas()["vec_id"])
        exact = set(topk_vectors(df, q, 10).toPandas()["vec_id"])
        assert len(approx & exact) >= 5

    def test_more_probes_never_worse(self, index):
        idx, df = index
        q = DS.query_vecs[1].astype(np.float64)
        exact = set(topk_vectors(df, q, 10).toPandas()["vec_id"])
        r1 = len(set(idx.search(q, 10, nprobe=1).toPandas()["vec_id"]) & exact)
        r4 = len(set(idx.search(q, 10, nprobe=4).toPandas()["vec_id"]) & exact)
        r8 = len(set(idx.search(q, 10, nprobe=8).toPandas()["vec_id"]) & exact)
        assert r1 <= r4 <= r8
