"""Tests for the four evaluation-dataset analogs."""
import numpy as np
import pytest

from repro.embed.datasets import DATASET_NAMES, DATASET_SPECS, build_dataset


class TestSpecs:
    @pytest.mark.parametrize("name", DATASET_NAMES)
    def test_buildable_at_test_scale(self, name):
        ds = build_dataset(name, "test")
        assert ds.n_vectors > 0
        assert ds.n_categories > 0

    def test_unknown_name_raises(self):
        with pytest.raises(KeyError):
            build_dataset("imagenet")

    def test_unknown_scale_raises(self):
        with pytest.raises(ValueError):
            build_dataset("coco", "huge")

    def test_memoized(self):
        assert build_dataset("coco", "test") is build_dataset("coco", "test")

    def test_seed_offset_changes_world(self):
        a = build_dataset("coco", "test")
        b = build_dataset("coco", "test", seed_offset=1)
        assert not np.array_equal(a.query_vecs, b.query_vecs)


class TestStructure:
    def test_objectnet_single_vector_images(self):
        ds = build_dataset("objectnet", "test")
        assert ds.is_coarse.all()
        assert ds.n_vectors == ds.n_images

    def test_bdd_largest_grid(self):
        assert DATASET_SPECS["bdd"].grid == (3, 5)
        ds = build_dataset("bdd", "test")
        assert ds.n_vectors == ds.n_images * 16

    def test_lvis_coco_same_grid(self):
        assert DATASET_SPECS["lvis"].grid == DATASET_SPECS["coco"].grid

    @pytest.mark.parametrize("name", DATASET_NAMES)
    def test_category_counts_ordered_like_paper(self, name):
        # Paper: LVIS (1400) > ObjNet (300) > COCO (80) > BDD (~10).
        c = {n: DATASET_SPECS[n].n_categories for n in DATASET_NAMES}
        assert c["lvis"] > c["objectnet"] > c["coco"] > c["bdd"]

    def test_bdd_rare_classes_are_tail(self):
        assert DATASET_SPECS["bdd"].tail_on_rarest
        assert DATASET_SPECS["bdd"].tail_size_factor < 1.0


class TestZeroShotDifficultyOrdering:
    """The zero-shot difficulty ordering of the paper's Figure 1 must hold
    at test scale: COCO easiest; LVIS hardest of the multiscale datasets."""

    @pytest.fixture(scope="class")
    def zs_map(self):
        from repro.baselines import ZeroShotRanker
        from repro.bench.loop import run_search

        out = {}
        for name in DATASET_NAMES:
            ds = build_dataset(name, "test").coarse_only()
            aps = [
                run_search(ds, c, ZeroShotRanker()).ap
                for c in range(ds.n_categories)
            ]
            out[name] = float(np.mean(aps))
        return out

    def test_coco_among_easiest(self, zs_map):
        # test-scale worlds are small; require COCO to beat the two datasets
        # the paper shows as clearly harder (exact top spot is noise).
        assert zs_map["coco"] > zs_map["lvis"]
        assert zs_map["coco"] > zs_map["bdd"]

    def test_all_above_chance(self, zs_map):
        assert all(v > 0.3 for v in zs_map.values())

    def test_none_saturated(self, zs_map):
        assert any(v < 0.95 for v in zs_map.values())
