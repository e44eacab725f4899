"""Unit tests for the fault-tolerance discrete-event simulation (E5)."""
import numpy as np
import pytest

from repro.sim.faultsim import loader_failure_sim, planner_failure_sim


BASE = 0.05


class TestPlannerFailures:
    def test_no_failures_flat(self):
        tr = planner_failure_sim(n_iters=20, fail_every=1000, prefetch_buffer=2)
        assert np.allclose(tr.fetch_s, BASE)

    def test_small_buffer_spikes(self):
        tr = planner_failure_sim(prefetch_buffer=2, recovery_iters=3)
        assert len(tr.spikes(BASE)) > 0

    def test_large_buffer_hides_recovery(self):
        tr = planner_failure_sim(prefetch_buffer=4, recovery_iters=3)
        assert len(tr.spikes(BASE)) == 0

    def test_spike_positions_follow_schedule(self):
        tr = planner_failure_sim(
            n_iters=60, warmup=5, fail_every=15, prefetch_buffer=2, recovery_iters=3
        )
        # failures hit at iters 20, 35, 50; spikes appear when the
        # 2-unit buffer drains, within a few iters of each injection
        for s in tr.spikes(BASE):
            assert any(0 <= s - f <= 4 for f in (20, 35, 50))

    def test_total_time_ordering(self):
        small = planner_failure_sim(prefetch_buffer=2, recovery_iters=3)
        big = planner_failure_sim(prefetch_buffer=4, recovery_iters=3)
        assert small.total_time_s > big.total_time_s

    def test_buffer_must_be_positive(self):
        with pytest.raises(ValueError):
            planner_failure_sim(prefetch_buffer=0)

    def test_recovery_between_failures(self):
        tr = planner_failure_sim(prefetch_buffer=2, recovery_iters=3, n_iters=60)
        # fetch returns to base between injections
        assert tr.fetch_s[30] == BASE


class TestLoaderFailures:
    def test_shadow_immediate_recovery(self):
        tr = loader_failure_sim(use_shadow=True)
        assert len(tr.spikes(BASE)) == 0
        assert tr.total_time_s == pytest.approx(60.0)

    def test_replay_spikes(self):
        tr = loader_failure_sim(use_shadow=False, replay_iters=4)
        spikes = tr.spikes(BASE)
        assert len(spikes) > 0
        assert spikes.min() >= 35

    def test_replay_spike_decays(self):
        tr = loader_failure_sim(use_shadow=False, replay_iters=4)
        assert tr.fetch_s[35] > tr.fetch_s[37]

    def test_more_killed_bigger_spike(self):
        few = loader_failure_sim(use_shadow=False, n_killed=5)
        many = loader_failure_sim(use_shadow=False, n_killed=10)
        assert many.fetch_s[35] > few.fetch_s[35]

    def test_shadow_beats_replay_total_time(self):
        sh = loader_failure_sim(use_shadow=True)
        rp = loader_failure_sim(use_shadow=False)
        assert sh.total_time_s < rp.total_time_s

    def test_zero_killed_flat(self):
        tr = loader_failure_sim(n_killed=0, use_shadow=False)
        assert np.allclose(tr.fetch_s, BASE)

    def test_kill_out_of_range(self):
        with pytest.raises(ValueError):
            loader_failure_sim(n_killed=100, n_loaders=64)

    def test_kill_after_run_is_noop(self):
        tr = loader_failure_sim(kill_at=999, use_shadow=False)
        assert np.allclose(tr.fetch_s, BASE)
