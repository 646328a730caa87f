"""MAPE-loop adaptivity policy (paper §3.4)."""
import numpy as np
import pandas as pd
import pytest

from repro.controller.adaptivity import AdaptiveController, AdaptivityParams


def _ctrl(**kw):
    defaults = dict(window_batches=2, min_window_queries=0, cooldown_batches=0)
    defaults.update(kw)
    return AdaptiveController(params=AdaptivityParams(**defaults))


def _loc(qids, value):
    return pd.Series([value] * len(qids), index=pd.Index(qids, name="qid"))


class TestWindow:
    def test_window_qids_tumbling(self):
        c = _ctrl()
        c.observe_batch(0, _loc([1, 2], 1.0), np.array([1.0, 1.0]))
        c.observe_batch(1, _loc([3, 4], 1.0), np.array([1.0, 1.0]))
        c.observe_batch(2, _loc([5, 6], 1.0), np.array([1.0, 1.0]))
        assert set(c.window_qids(2)) == {3, 4, 5, 6}  # window = last 2 batches

    def test_window_query_cap(self):
        c = _ctrl(max_window_queries=3)
        c.observe_batch(0, _loc([1, 2], 1.0), np.array([1.0, 1.0]))
        c.observe_batch(1, _loc([3, 4], 1.0), np.array([1.0, 1.0]))
        assert len(c.window_qids(1)) == 3

    def test_window_locality_mean(self):
        c = _ctrl()
        c.observe_batch(0, _loc([1, 2], 0.2), np.array([1.0, 1.0]))
        c.observe_batch(1, _loc([3, 4], 0.6), np.array([1.0, 1.0]))
        assert c.window_locality(1) == pytest.approx(0.4)

    def test_window_locality_no_stats(self):
        assert _ctrl().window_locality(0) == 1.0

    def test_window_imbalance_sums_before_deviation(self):
        c = _ctrl()
        # alternating hot workers: individually imbalanced, summed balanced
        c.observe_batch(0, _loc([1], 1.0), np.array([10.0, 0.0]))
        c.observe_batch(1, _loc([2], 1.0), np.array([0.0, 10.0]))
        assert c.window_imbalance(1) == pytest.approx(0.0)

    def test_window_imbalance_hot_worker(self):
        c = _ctrl()
        c.observe_batch(0, _loc([1], 1.0), np.array([10.0, 0.0]))
        assert c.window_imbalance(0) == pytest.approx(1.0)

    def test_window_imbalance_empty(self):
        assert _ctrl().window_imbalance(5) == 0.0


class TestTrigger:
    def test_low_locality_triggers(self):
        c = _ctrl(phi=0.7)
        c.observe_batch(0, _loc([1, 2], 0.1), np.array([1.0, 1.0]))
        assert c.should_repartition(0)

    def test_high_locality_balanced_does_not_trigger(self):
        c = _ctrl(phi=0.7, imbalance_trigger=0.5)
        c.observe_batch(0, _loc([1, 2], 0.95), np.array([5.0, 5.0]))
        assert not c.should_repartition(0)

    def test_imbalance_triggers_even_when_local(self):
        """Balance violations make the partitioning suboptimal too (Fig. 6e:
        Q-cut always ensures workload balance)."""
        c = _ctrl(phi=0.7, imbalance_trigger=0.5)
        c.observe_batch(0, _loc([1, 2], 1.0), np.array([20.0, 0.0]))
        assert c.should_repartition(0)

    def test_cooldown_blocks(self):
        c = _ctrl(cooldown_batches=1)
        c.observe_batch(0, _loc([1, 2], 0.0), np.array([1.0, 1.0]))
        c.repartitioned(0)
        assert not c.should_repartition(0)
        assert not c.should_repartition(1)
        c.observe_batch(1, _loc([3, 4], 0.0), np.array([1.0, 1.0]))
        assert c.should_repartition(2)

    def test_min_window_queries_gate(self):
        c = _ctrl(min_window_queries=5)
        c.observe_batch(0, _loc([1, 2], 0.0), np.array([1.0, 1.0]))
        assert not c.should_repartition(0)  # only 2 queries of stats
        c.observe_batch(1, _loc([3, 4, 5], 0.0), np.array([1.0, 1.0]))
        assert c.should_repartition(1)

    def test_defaults_match_paper(self):
        p = AdaptivityParams()
        assert p.phi == 0.7
        assert p.delta == 0.25
        assert p.max_window_queries == 128
