"""Integration tests: the Spark sweep runner vs direct serial execution."""
import numpy as np
import pytest

from repro.baselines import RocchioRanker, ZeroShotRanker
from repro.bench.loop import run_search
from repro.bench.runner import build_bundle, make_ranker, run_sweep
from repro.embed.clipsim import WorldSpec, generate_world

DS = generate_world(WorldSpec(n_images=120, n_categories=6, d=16, grid=(1, 2), seed=12))


@pytest.fixture(scope="module")
def bundles():
    return {
        "toy:multi": build_bundle(DS, with_graph=True),
        "toy:coarse": build_bundle(DS.coarse_only(), with_graph=True),
    }


class TestMakeRanker:
    def test_all_methods_constructible(self, bundles):
        b = bundles["toy:coarse"]
        for m in ("zeroshot", "fewshot", "rocchio", "seesaw", "ens"):
            assert make_ranker(m, {}, b) is not None

    def test_unknown_method_raises(self, bundles):
        with pytest.raises(KeyError):
            make_ranker("nope", {}, bundles["toy:coarse"])

    def test_seesaw_without_m_raises(self):
        bare = build_bundle(DS, with_m=False)
        with pytest.raises(ValueError):
            make_ranker("seesaw", {}, bare)

    def test_ens_without_graph_raises(self):
        bare = build_bundle(DS.coarse_only(), with_graph=False)
        with pytest.raises(ValueError):
            make_ranker("ens", {}, bare)


class TestSweep:
    def test_sweep_matches_serial(self, spark, bundles):
        """The distributed sweep must reproduce serial run_search exactly."""
        tasks = [
            {"bundle": "toy:multi", "method": m, "cat": c}
            for m in ("zeroshot", "rocchio")
            for c in range(DS.n_categories)
        ]
        res = run_sweep(spark, bundles, tasks)
        assert len(res) == len(tasks)
        for r in res.itertuples(index=False):
            ranker = ZeroShotRanker() if r.method == "zeroshot" else RocchioRanker()
            serial = run_search(DS, r.cat, ranker)
            assert serial.ap == pytest.approx(r.ap, abs=1e-12), (r.method, r.cat)
            assert serial.n_found == r.n_found
            assert serial.n_shown == r.n_shown

    def test_sweep_seesaw_deterministic(self, spark, bundles):
        tasks = [
            {"bundle": "toy:multi", "method": "seesaw", "cat": c}
            for c in range(3)
        ]
        r1 = run_sweep(spark, bundles, tasks).sort_values("cat")["ap"].to_numpy()
        r2 = run_sweep(spark, bundles, tasks).sort_values("cat")["ap"].to_numpy()
        np.testing.assert_array_equal(r1, r2)

    def test_sweep_custom_params_flow_through(self, spark, bundles):
        tasks = [
            {
                "bundle": "toy:coarse",
                "method": "ens",
                "config": "ens t=1",
                "params": {"horizon": 1},
                "cat": 0,
            }
        ]
        res = run_sweep(spark, bundles, tasks)
        assert res["config"].iloc[0] == "ens t=1"
        assert 0.0 <= res["ap"].iloc[0] <= 1.0

    def test_result_columns(self, spark, bundles):
        res = run_sweep(
            spark,
            bundles,
            [{"bundle": "toy:coarse", "method": "zeroshot", "cat": 0}],
        )
        assert set(res.columns) == {
            "bundle",
            "method",
            "config",
            "cat",
            "ap",
            "n_found",
            "n_shown",
            "n_relevant",
        }
