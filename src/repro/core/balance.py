"""Load-balancing and packing algorithms (``balance`` primitive, §4.2).

Pure NumPy implementations shared by the Spark data plane
(:mod:`repro.core.primitives`) and the simulators:

- :func:`greedy_binpack` — longest-processing-time-first greedy number
  partitioning ("greedybinpacking" in the paper).
- :func:`karmarkar_karp` — k-way Karmarkar–Karp largest-differencing
  partitioning [8].
- :func:`pack_sequences` — first-fit-decreasing packing of variable-
  length subsequences into fixed-capacity training sequences with
  segment boundaries (microbatch "Packing" transform, §2.1).
- :func:`balance_two_level` — inter-microbatch balancing: items →
  buckets (DP ranks) → bins (microbatches), optionally preserving
  arrival order inside a bucket (intra-microbatch reordering disabled).
"""
from __future__ import annotations

import heapq
from dataclasses import dataclass

import numpy as np


def _validate(costs: np.ndarray, n_bins: int) -> np.ndarray:
    costs = np.asarray(costs, dtype=np.float64)
    if costs.ndim != 1:
        raise ValueError("costs must be 1-D")
    if n_bins <= 0:
        raise ValueError("n_bins must be positive")
    if (costs < 0).any():
        raise ValueError("costs must be non-negative")
    return costs


def greedy_binpack(costs: np.ndarray, n_bins: int) -> np.ndarray:
    """LPT greedy: sort items by descending cost, always assign to the
    currently lightest bin. Returns the bin index per item (original
    order). O(n log n); 4/3-approximate for makespan."""
    costs = _validate(costs, n_bins)
    assign = np.empty(len(costs), dtype=np.int64)
    if len(costs) == 0:
        return assign
    order = np.argsort(-costs, kind="stable")
    heap = [(0.0, b) for b in range(n_bins)]
    heapq.heapify(heap)
    for i in order:
        load, b = heapq.heappop(heap)
        assign[i] = b
        heapq.heappush(heap, (load + costs[i], b))
    return assign


def karmarkar_karp(costs: np.ndarray, n_bins: int) -> np.ndarray:
    """k-way Karmarkar–Karp largest differencing method.

    Each heap entry is a k-tuple of partial bin loads plus the item sets
    behind them; repeatedly merge the two entries with the largest
    spread, pairing the heaviest sub-bin of one with the lightest of the
    other. Returns bin index per item. Typically much tighter than LPT
    on heavy-tailed inputs.
    """
    costs = _validate(costs, n_bins)
    n = len(costs)
    assign = np.empty(n, dtype=np.int64)
    if n == 0:
        return assign
    if n_bins == 1:
        assign[:] = 0
        return assign

    # entry: (-spread, tiebreak, loads desc, items-per-slot)
    heap: list[tuple[float, int, list[float], list[list[int]]]] = []
    for i in range(n):
        loads = [float(costs[i])] + [0.0] * (n_bins - 1)
        items: list[list[int]] = [[i]] + [[] for _ in range(n_bins - 1)]
        heap.append((-loads[0], i, loads, items))
    heapq.heapify(heap)

    tiebreak = n
    while len(heap) > 1:
        s1, _, l1, it1 = heapq.heappop(heap)
        s2, _, l2, it2 = heapq.heappop(heap)
        # pair heaviest of one with lightest of the other
        merged_loads = [l1[j] + l2[n_bins - 1 - j] for j in range(n_bins)]
        merged_items = [it1[j] + it2[n_bins - 1 - j] for j in range(n_bins)]
        order = sorted(range(n_bins), key=lambda j: -merged_loads[j])
        loads = [merged_loads[j] for j in order]
        items = [merged_items[j] for j in order]
        spread = loads[0] - loads[-1]
        heapq.heappush(heap, (-spread, tiebreak, loads, items))
        tiebreak += 1

    _, _, _, items = heap[0]
    for b, bucket in enumerate(items):
        for i in bucket:
            assign[i] = b
    return assign


_METHODS = {
    "greedy": greedy_binpack,
    "greedybinpacking": greedy_binpack,
    "karmarkar_karp": karmarkar_karp,
    "karmarkar-karp": karmarkar_karp,
}


def balance_method(name: str):
    """Resolve a balancing method by its paper name; extension point for
    user strategies (e.g. Zig-Zag) via :func:`register_method`."""
    try:
        return _METHODS[name.lower()]
    except KeyError:
        raise KeyError(
            f"unknown balance method {name!r}; known: {sorted(_METHODS)}"
        ) from None


def register_method(name: str, fn) -> None:
    """Framework extension API: register a custom balancing strategy."""
    _METHODS[name.lower()] = fn


def bin_loads(costs: np.ndarray, assign: np.ndarray, n_bins: int) -> np.ndarray:
    """Total cost per bin for an assignment."""
    return np.bincount(assign, weights=np.asarray(costs, dtype=np.float64), minlength=n_bins)


def imbalance(costs: np.ndarray, assign: np.ndarray, n_bins: int) -> float:
    """max/mean load ratio — 1.0 is perfectly balanced."""
    loads = bin_loads(costs, assign, n_bins)
    mean = loads.mean()
    return float(loads.max() / mean) if mean > 0 else 1.0


# ---------------------------------------------------------------------------
# Sequence packing (microbatch transformation).
# ---------------------------------------------------------------------------


@dataclass(frozen=True)
class PackedSequence:
    """One training sequence assembled from subsequences: ``items`` are
    input indices, ``lengths`` their token counts, ``capacity`` the
    context length. Attention with segment masks costs sum(l_i^2), not
    (sum l_i)^2 — the quantity :func:`attention_cost` reports."""

    items: tuple[int, ...]
    lengths: tuple[int, ...]
    capacity: int

    @property
    def used(self) -> int:
        return int(sum(self.lengths))

    @property
    def padding(self) -> int:
        return self.capacity - self.used

    def attention_cost(self) -> float:
        return float(sum(l * l for l in self.lengths))


def pack_sequences(lengths: np.ndarray, capacity: int) -> list[PackedSequence]:
    """First-fit-decreasing packing of subsequences into sequences of
    ``capacity`` tokens. Lengths above capacity are truncated to it (the
    framework's crop behaviour). Deterministic for a given input order."""
    lengths = np.asarray(lengths, dtype=np.int64)
    if capacity <= 0:
        raise ValueError("capacity must be positive")
    clipped = np.minimum(lengths, capacity)
    order = np.argsort(-clipped, kind="stable")
    bins: list[tuple[int, list[int]]] = []  # (remaining, item list)
    for i in order:
        l = int(clipped[i])
        placed = False
        for b, (rem, items) in enumerate(bins):
            if rem >= l:
                bins[b] = (rem - l, items + [int(i)])
                placed = True
                break
        if not placed:
            bins.append((capacity - l, [int(i)]))
    return [
        PackedSequence(
            items=tuple(items),
            lengths=tuple(int(clipped[i]) for i in items),
            capacity=capacity,
        )
        for _, items in bins
    ]


def pad_cost(lengths: np.ndarray, capacity: int) -> int:
    """Dummy tokens added by the Padding transform for one microbatch."""
    lengths = np.minimum(np.asarray(lengths, dtype=np.int64), capacity)
    return int((capacity - lengths).sum())


# ---------------------------------------------------------------------------
# Two-level (inter-microbatch) balancing.
# ---------------------------------------------------------------------------


def balance_two_level(
    costs: np.ndarray,
    n_buckets: int,
    n_bins: int,
    *,
    method: str = "karmarkar_karp",
    intra_reorder: bool = True,
) -> tuple[np.ndarray, np.ndarray]:
    """Assign items to (bucket, bin) = (DP rank, microbatch).

    Stage 1 balances items across buckets; stage 2 balances each
    bucket's items across its ``n_bins`` microbatches. With
    ``intra_reorder=False`` the per-bucket microbatch split preserves
    arrival order (round-robin chunks) so the global batch content per
    microbatch index is unchanged — the configuration knob the paper
    exposes for exact-reproducibility-sensitive runs.

    Returns (bucket_assignment, bin_assignment), both aligned to input
    order.
    """
    costs = _validate(costs, n_buckets * n_bins)
    fn = balance_method(method)
    bucket = fn(costs, n_buckets)
    bins = np.zeros(len(costs), dtype=np.int64)
    for b in range(n_buckets):
        idx = np.flatnonzero(bucket == b)
        if len(idx) == 0:
            continue
        if intra_reorder:
            bins[idx] = fn(costs[idx], n_bins)
        else:
            # contiguous arrival-order chunks of near-equal item count
            splits = np.array_split(np.arange(len(idx)), n_bins)
            for m, chunk in enumerate(splits):
                bins[idx[chunk]] = m
    return bucket, bins
