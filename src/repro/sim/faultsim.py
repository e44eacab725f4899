"""Fault-tolerance discrete-event simulation (E5, Fig. 16).

Reproduces the paper's two failure-injection experiments as an
iteration-granular state machine:

- **Planner failures** (Fig. 16 left): the trainer consumes one batch
  per iteration from a client prefetch buffer; a healthy pipeline
  (planner + loaders) refills it — when below capacity it catches up at
  ``refill_rate`` units/iteration. Killing the planner stops refills
  for ``recovery_iters`` (checkpoint reload). If the prefetch buffer
  holds enough units to cover recovery, the reload overlaps with
  training (no visible spike); an undersized buffer drains and the
  trainer-side barrier halts batch requests — a data-fetch-time spike
  and a longer run.
- **Loader failures** (Fig. 16 right): killing ``n_killed`` of
  ``n_loaders`` at a given step. With shadow loaders, warm standbys are
  promoted immediately (state already synchronised) and delivery never
  stalls. Without them, the failed loaders restore from their last
  differential checkpoint and *replay* the gap, stalling the fraction
  of each batch they supply for ``replay_iters`` iterations.

Both return per-iteration fetch-time traces — the exact series Fig. 16
plots — so jobs print them and tests assert spike presence/absence.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np


@dataclass(frozen=True)
class FaultTrace:
    """Per-iteration fetch times plus total elapsed time."""

    fetch_s: np.ndarray
    iter_time_s: np.ndarray

    @property
    def total_time_s(self) -> float:
        return float(self.iter_time_s.sum())

    def spikes(self, base_fetch_s: float, factor: float = 3.0) -> np.ndarray:
        """Iteration indices where fetch time exceeds factor x base."""
        return np.flatnonzero(self.fetch_s > factor * base_fetch_s)


def planner_failure_sim(
    *,
    n_iters: int = 60,
    warmup: int = 5,
    fail_every: int = 15,
    prefetch_buffer: int = 2,
    recovery_iters: int = 3,
    refill_rate: float = 2.0,
    base_fetch_s: float = 0.05,
    compute_s: float = 1.0,
) -> FaultTrace:
    """Inject a planner failure every ``fail_every`` iterations after
    ``warmup`` (the paper: every 15 iterations after 5 warmup steps, 64
    concurrent loaders, buffers of 2 and 4 units)."""
    if prefetch_buffer <= 0:
        raise ValueError("prefetch_buffer must be positive")
    buffer = float(prefetch_buffer)
    down_for = 0
    fetch = np.empty(n_iters)
    iter_time = np.empty(n_iters)
    for i in range(n_iters):
        if i >= warmup and (i - warmup) % fail_every == 0 and i > warmup:
            down_for = recovery_iters  # planner killed; reloading checkpoint
        # trainer wants 1 unit this iteration
        if buffer >= 1.0:
            buffer -= 1.0
            fetch[i] = base_fetch_s
        else:
            # barrier: wait until the pipeline is back and produces a unit
            wait = down_for * compute_s + (1.0 - buffer) / refill_rate * compute_s
            fetch[i] = base_fetch_s + wait
            down_for = 0
            buffer = 0.0
        # refill phase (overlapped with compute) unless planner is down
        if down_for > 0:
            down_for -= 1
        else:
            buffer = min(float(prefetch_buffer), buffer + refill_rate)
        iter_time[i] = compute_s + max(0.0, fetch[i] - base_fetch_s)
    return FaultTrace(fetch, iter_time)


def loader_failure_sim(
    *,
    n_iters: int = 60,
    n_loaders: int = 64,
    n_killed: int = 7,
    kill_at: int = 35,
    use_shadow: bool = True,
    replay_iters: int = 4,
    base_fetch_s: float = 0.05,
    compute_s: float = 1.0,
    promote_s: float = 0.01,
) -> FaultTrace:
    """Kill ``n_killed`` loaders at ``kill_at`` (paper: 5-10 of 64 at
    step 35). ``use_shadow=True`` promotes warm standbys (immediate
    recovery); ``False`` restores from differential checkpoints and
    replays, stalling the killed loaders' share of each batch."""
    if not (0 <= n_killed <= n_loaders):
        raise ValueError("n_killed must lie in [0, n_loaders]")
    share = n_killed / n_loaders
    fetch = np.full(n_iters, base_fetch_s)
    iter_time = np.full(n_iters, compute_s)
    if n_killed == 0 or kill_at >= n_iters:
        return FaultTrace(fetch, iter_time)
    if use_shadow:
        # promotion is a metadata swap; one fetch sees the tiny handover
        fetch[kill_at] += promote_s * share
    else:
        # replay window: the killed loaders' batch share arrives late
        for j in range(replay_iters):
            i = kill_at + j
            if i >= n_iters:
                break
            lag = compute_s * share * (replay_iters - j)
            fetch[i] += lag
            iter_time[i] += lag
    return FaultTrace(fetch, iter_time)
