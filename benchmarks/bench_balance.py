"""Micro-benchmarks for the balancing/packing algorithms the Planner
runs on every step (they sit on the plan-generation critical path)."""
import numpy as np
import pytest

from repro.core.balance import (
    balance_two_level,
    greedy_binpack,
    karmarkar_karp,
    pack_sequences,
)


@pytest.fixture(scope="module")
def heavy_costs():
    return np.random.default_rng(0).pareto(1.2, 10_000) + 1


def test_greedy_binpack_10k(benchmark, heavy_costs):
    assign = benchmark(greedy_binpack, heavy_costs, 32)
    assert len(assign) == 10_000


def test_karmarkar_karp_10k(benchmark, heavy_costs):
    assign = benchmark(karmarkar_karp, heavy_costs, 32)
    assert len(assign) == 10_000


def test_two_level_balance_step(benchmark, heavy_costs):
    bucket, bins = benchmark(
        balance_two_level, heavy_costs[:4096], 18, 4, method="karmarkar_karp"
    )
    assert bucket.max() < 18 and bins.max() < 4


def test_pack_sequences_4k(benchmark):
    lengths = np.random.default_rng(1).integers(1, 4096, 4096)
    seqs = benchmark(pack_sequences, lengths, 8192)
    assert sum(len(s.items) for s in seqs) == 4096
