"""Reproduction-shape tests: the paper's qualitative claims must hold on the
test-scale datasets. These are the assertions EXPERIMENTS.md relies on at
bench scale, checked cheaply in CI at test scale with loose tolerances.
"""
import numpy as np
import pytest

from repro.baselines import FewShotRanker, RocchioRanker, ZeroShotRanker
from repro.bench.loop import run_search
from repro.core.aligner import AlignerParams
from repro.core.seesaw import SeeSawSession
from repro.embed.datasets import DATASET_NAMES, build_dataset
from repro.graph.laplacian import build_db_alignment


def _maps(ds, make_ranker):
    return float(
        np.mean([run_search(ds, c, make_ranker()).ap for c in range(ds.n_categories)])
    )


@pytest.fixture(scope="module")
def worlds():
    out = {}
    for name in DATASET_NAMES:
        ds = build_dataset(name, "test")
        out[name] = (ds, ds.coarse_only())
    return out


@pytest.fixture(scope="module")
def m_matrices(worlds):
    return {
        name: build_db_alignment(pair[0].vectors, k=10)
        for name, pair in worlds.items()
    }


class TestMultiscaleShape:
    def test_multiscale_helps_bdd(self, worlds):
        ds, dsc = worlds["bdd"]
        assert _maps(ds, ZeroShotRanker) > _maps(dsc, ZeroShotRanker)

    def test_multiscale_noop_objectnet(self, worlds):
        ds, dsc = worlds["objectnet"]
        assert _maps(ds, ZeroShotRanker) == pytest.approx(
            _maps(dsc, ZeroShotRanker), abs=1e-9
        )


class TestSeeSawShape:
    @pytest.mark.parametrize("name", ["lvis", "coco", "bdd"])
    def test_seesaw_beats_zero_shot_multiscale(self, worlds, m_matrices, name):
        ds, _ = worlds[name]
        M = m_matrices[name]
        ss = _maps(ds, lambda: SeeSawSession(AlignerParams(), M=M))
        zs = _maps(ds, ZeroShotRanker)
        assert ss >= zs - 0.02

    def test_seesaw_beats_fewshot_on_lvis(self, worlds, m_matrices):
        ds, _ = worlds["lvis"]
        M = m_matrices["lvis"]
        ss = _maps(ds, lambda: SeeSawSession(AlignerParams(), M=M))
        fs = _maps(ds, FewShotRanker)
        assert ss > fs

    def test_clip_align_protects_against_fewshot_regression(self, worlds):
        """Adding the lambda_c term must recover most of any few-shot drop
        (the core CLIP-alignment claim)."""
        ds, _ = worlds["bdd"]
        zs = _maps(ds, ZeroShotRanker)
        qa = _maps(ds, lambda: SeeSawSession(AlignerParams(lam_d=0)))
        assert qa >= zs - 0.05


class TestBaselineShape:
    def test_rocchio_between_zero_shot_and_seesaw_avg(self, worlds, m_matrices):
        zs, ro, ss = [], [], []
        for name in DATASET_NAMES:
            ds, _ = worlds[name]
            zs.append(_maps(ds, ZeroShotRanker))
            ro.append(_maps(ds, RocchioRanker))
            ss.append(_maps(ds, lambda: SeeSawSession(AlignerParams(), M=m_matrices[name])))
        assert np.mean(ro) >= np.mean(zs) - 0.02
        assert np.mean(ss) >= np.mean(ro) - 0.03
