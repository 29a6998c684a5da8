"""Tests for the Table 5 annotation-time model and Spark aggregation."""
import numpy as np
import pytest

from repro.bench import usertime


class TestSimulation:
    def test_deterministic(self):
        a = usertime.simulate_events(seed=1)
        b = usertime.simulate_events(seed=1)
        assert a.equals(b)

    def test_seed_changes_events(self):
        a = usertime.simulate_events(seed=1)
        b = usertime.simulate_events(seed=2)
        assert not a["seconds"].equals(b["seconds"])

    def test_event_counts(self):
        ev = usertime.simulate_events(n_users=5, images_per_user=10)
        assert len(ev) == 5 * 2 * 10

    def test_all_positive_times(self):
        ev = usertime.simulate_events()
        assert (ev["seconds"] > 0).all()

    def test_marked_slower_within_system(self):
        ev = usertime.simulate_events(n_users=30)
        m = ev.groupby(["system", "marked"])["seconds"].mean()
        assert m[("baseline", True)] > m[("baseline", False)]
        assert m[("seesaw", True)] > m[("seesaw", False)]

    def test_seesaw_overhead(self):
        ev = usertime.simulate_events(n_users=30)
        m = ev.groupby(["system", "marked"])["seconds"].mean()
        assert m[("seesaw", True)] > m[("baseline", True)]
        assert m[("seesaw", False)] > m[("baseline", False)]


class TestTable5:
    @pytest.fixture(scope="class")
    def t5(self, spark):
        return usertime.table5(spark, n_users=40, seed=0)

    def test_four_cells(self, t5):
        assert len(t5) == 4
        assert set(t5["label"]) == {"not marked", "marked relevant"}

    def test_ci_positive(self, t5):
        assert (t5["ci95"] > 0).all()

    def test_means_near_paper(self, t5):
        """Means must land near the paper's values (the model priors)."""
        from repro.bench.harness import PAPER

        for r in t5.itertuples(index=False):
            paper_mean, _ = PAPER["table5"][(r.system, r.label)]
            assert r.mean_s == pytest.approx(paper_mean, rel=0.15)

    def test_box_overhead_about_1_5s(self, t5):
        cell = t5.set_index(["system", "label"])["mean_s"]
        overhead = cell[("seesaw", "marked relevant")] - cell[("baseline", "marked relevant")]
        assert 0.8 < overhead < 2.5
