"""Integration tests for the table harness drivers (test-scale datasets)."""
import numpy as np
import pytest

from repro.bench import harness


@pytest.fixture(scope="module")
def t2(spark):
    return harness.table2(spark, "test")


@pytest.fixture(scope="module")
def t3(spark):
    return harness.table3(spark, "test")


class TestTable2:
    def test_all_configs_present(self, t2):
        assert set(t2["config"]) == {
            "zero-shot CLIP",
            "+multiscale",
            "+few-shot CLIP",
            "+Query align",
            "+DB align",
        }

    def test_all_datasets_present(self, t2):
        assert set(t2["dataset"]) == {"lvis", "objectnet", "coco", "bdd"}

    def test_map_in_range(self, t2):
        assert t2["map_all"].between(0, 1).all()

    def test_query_counts_match_categories(self, t2):
        from repro.embed.datasets import build_dataset

        for name, grp in t2.groupby("dataset"):
            assert (grp["n_queries"] == build_dataset(name, "test").n_categories).all()

    def test_objectnet_multiscale_noop(self, t2):
        """ObjectNet images are single-vector: multiscale == zero-shot."""
        sub = t2[t2["dataset"] == "objectnet"].set_index("config")
        assert sub.loc["+multiscale", "map_all"] == pytest.approx(
            sub.loc["zero-shot CLIP", "map_all"], abs=1e-9
        )

    def test_seesaw_beats_zero_shot_on_average(self, t2):
        by = t2.groupby("config")["map_all"].mean()
        assert by["+DB align"] > by["zero-shot CLIP"]

    def test_pivot_shape(self, t2):
        wide = harness.pivot(t2)
        assert list(wide.columns) == ["lvis", "objectnet", "coco", "bdd", "avg"]
        assert wide.index[0] == "zero-shot CLIP"


class TestTable3:
    def test_all_configs_present(self, t3):
        assert set(t3["config"]) == {
            "zero-shot CLIP",
            "few-shot CLIP",
            "ENS",
            "Rocchio",
            "this work",
        }

    def test_map_in_range(self, t3):
        assert t3["map_all"].between(0, 1).all()

    def test_hard_subset_not_larger_than_all(self, t3):
        assert (t3["n_hard"] <= t3["n_queries"]).all()


class TestTable4:
    @pytest.fixture(scope="class")
    def t4(self, spark):
        return harness.table4(spark, "test")

    def test_horizon_configs_present(self, t4):
        labels = set(t4["config"])
        for t in (1, 2, 10, 60):
            assert f"raw t={t}" in labels
            assert f"calibrated t={t}" in labels

    def test_calibrated_beats_raw_at_long_horizon(self, t4):
        by = t4.groupby("config")["map_all"].mean()
        assert by["calibrated t=60"] >= by["raw t=60"] - 0.02

    def test_raw_degrades_with_horizon(self, t4):
        by = t4.groupby("config")["map_all"].mean()
        assert by["raw t=60"] <= by["raw t=1"] + 0.02


class TestHardSubsets:
    def test_hard_subsets_from_results(self):
        import pandas as pd

        res = pd.DataFrame(
            {
                "bundle": ["a:coarse"] * 3,
                "config": ["zero-shot CLIP"] * 3,
                "cat": [0, 1, 2],
                "ap": [0.9, 0.3, 0.49],
            }
        )
        hard = harness.hard_subsets(res)
        np.testing.assert_array_equal(hard["a"], [False, True, True])
