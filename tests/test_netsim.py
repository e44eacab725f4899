"""Unit tests for the connectivity / data-feeding models (E1 fetch, E6)."""
import math

import numpy as np
import pytest

from repro.data.sources import coyo_lite
from repro.sim.netsim import (
    FeedTrace,
    actor_model_scalability,
    demand_per_iteration_s,
    feed_simulation,
    fetch_latency_ms,
)


class TestFetchLatency:
    def test_monotone(self):
        assert fetch_latency_ms(10) < fetch_latency_ms(1000)

    def test_collapse_past_hard_cap(self):
        assert math.isinf(fetch_latency_ms(4000))

    def test_base_latency_at_small_fanout(self):
        assert fetch_latency_ms(1) == pytest.approx(2.0, rel=0.01)

    def test_rejects_nonpositive(self):
        with pytest.raises(ValueError):
            fetch_latency_ms(0)


class TestScalability:
    def test_fig18_shape(self):
        pts = actor_model_scalability([1024, 2048, 4096])
        by_gpus = {p.n_gpus: p for p in pts}
        # 1k GPUs: modest gap
        assert by_gpus[1024].slowdown < by_gpus[2048].slowdown
        # 2k GPUs: order-of-magnitude latency increase for direct transfer
        assert by_gpus[2048].slowdown >= 5.0
        # 4k GPUs: direct transfer collapses, constructor path survives
        assert by_gpus[4096].direct_collapsed
        assert not math.isinf(by_gpus[4096].constructor_latency_ms)

    def test_constructor_latency_stays_bounded(self):
        pts = actor_model_scalability([1024, 2048, 4096])
        lat = [p.constructor_latency_ms for p in pts]
        assert max(lat) < 100.0


class TestDemand:
    def test_weighted_mixture(self):
        specs = coyo_lite()
        uniform = np.ones(len(specs))
        d = demand_per_iteration_s(specs, uniform, samples_per_iter=100)
        mean_cost = np.mean([s.transform_cost_s for s in specs])
        assert d == pytest.approx(100 * mean_cost)

    def test_skewed_weights(self):
        specs = coyo_lite()
        costs = [s.transform_cost_s for s in specs]
        heavy = np.zeros(len(specs))
        heavy[int(np.argmax(costs))] = 1.0
        light = np.zeros(len(specs))
        light[int(np.argmin(costs))] = 1.0
        assert demand_per_iteration_s(specs, heavy, 10) > demand_per_iteration_s(
            specs, light, 10
        )


class TestFeedSimulation:
    def test_overprovisioned_is_stable(self):
        tr = feed_simulation(demand_s=1.0, n_workers=4, iter_budget_s=1.0, seed=0)
        assert tr.stable
        assert tr.std < 0.05

    def test_underprovisioned_grows(self):
        tr = feed_simulation(demand_s=8.0, n_workers=4, iter_budget_s=1.0, seed=0)
        assert not tr.stable
        assert tr.fetch_s[-1] > tr.fetch_s[0]

    def test_borderline_fluctuates(self):
        tr = feed_simulation(
            demand_s=3.9, n_workers=4, iter_budget_s=1.0, jitter_cv=0.5, seed=1
        )
        over = feed_simulation(demand_s=1.0, n_workers=4, iter_budget_s=1.0, seed=1)
        assert tr.std > over.std  # severe fluctuations near saturation

    def test_deterministic_in_seed(self):
        a = feed_simulation(demand_s=2.0, n_workers=2, iter_budget_s=1.0, seed=5)
        b = feed_simulation(demand_s=2.0, n_workers=2, iter_budget_s=1.0, seed=5)
        assert np.allclose(a.fetch_s, b.fetch_s)

    def test_rejects_bad_params(self):
        with pytest.raises(ValueError):
            feed_simulation(demand_s=1.0, n_workers=0, iter_budget_s=1.0)

    def test_trace_stats(self):
        tr = FeedTrace(np.array([1.0, 3.0]))
        assert tr.mean == 2.0 and tr.std == 1.0
