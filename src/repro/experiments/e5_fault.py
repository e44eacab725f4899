"""E5 — non-interrupted fault tolerance (§7.5, Fig. 16).

Left panel: Planner failure injection every 15 iterations after 5
warm-up steps under prefetch buffers of 2 and 4 units (64 concurrent
loaders). Right panel: randomly terminating 5-10 of 64 loaders at step
35, with shadow-loader promotion vs differential-checkpoint replay.

Additionally an end-to-end functional check: a real Planner + loaders +
ShadowLoader fleet survives a loader kill with identical delivered
samples (the discrete-event traces quantify the latency shape; the
functional path proves no sample is lost or duplicated).
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np
import pandas as pd

from repro.core.checkpoint import CheckpointStore, DifferentialCheckpointer, ShadowLoader
from repro.core.placetree import ClientPlaceTree
from repro.core.planner import Planner
from repro.core.source_loader import SourceLoader
from repro.data.mixture import ConstantSchedule
from repro.data.sources import coyo_lite
from repro.sim.faultsim import FaultTrace, loader_failure_sim, planner_failure_sim


@dataclass(frozen=True)
class E5Result:
    label: str
    trace: FaultTrace
    n_spikes: int
    total_time_s: float


def planner_panel(*, n_iters: int = 60, base_fetch_s: float = 0.05) -> list[E5Result]:
    """Fig. 16 left: prefetch buffer 2 vs 4."""
    out = []
    for buf in (2, 4):
        tr = planner_failure_sim(
            n_iters=n_iters, prefetch_buffer=buf, base_fetch_s=base_fetch_s
        )
        out.append(
            E5Result(
                f"planner-fail buffer={buf}",
                tr,
                len(tr.spikes(base_fetch_s)),
                tr.total_time_s,
            )
        )
    return out


def loader_panel(
    *, n_killed: int = 7, n_iters: int = 60, base_fetch_s: float = 0.05
) -> list[E5Result]:
    """Fig. 16 right: shadow promotion vs checkpoint replay."""
    out = []
    for shadow in (True, False):
        tr = loader_failure_sim(
            n_iters=n_iters,
            n_killed=n_killed,
            use_shadow=shadow,
            base_fetch_s=base_fetch_s,
        )
        label = "loader-fail shadow" if shadow else "loader-fail replay"
        out.append(
            E5Result(label, tr, len(tr.spikes(base_fetch_s)), tr.total_time_s)
        )
    return out


def functional_shadow_recovery(
    *, n_steps_before: int = 3, n_steps_after: int = 3, kill_fraction: float = 0.4
) -> dict:
    """Run a real Planner over coyo loaders with shadows; kill a subset
    mid-run, promote, and verify the delivered sample stream equals an
    uninterrupted run's stream."""
    def build():
        specs = coyo_lite()
        loaders = [SourceLoader(s, seed=1, buffer_capacity=2048) for s in specs]
        tree = ClientPlaceTree.from_degrees(dp=2)
        sched = ConstantSchedule([1.0] * len(specs))
        pl = Planner(loaders, tree, sched, batch_size=40, method=None)
        return specs, loaders, pl

    # reference: uninterrupted run
    _, ref_loaders, ref_pl = build()
    ref_stream = []
    for _ in range(n_steps_before + n_steps_after):
        ref_pl.ensure_buffered(60)
        p = ref_pl.plan_step()
        ref_stream.append(p.assignments[["source_id", "row_idx"]])
    ref = pd.concat(ref_stream, ignore_index=True)

    # faulty run with shadows
    specs, loaders, pl = build()
    store = CheckpointStore()
    ckpt = DifferentialCheckpointer(store, loader_interval=2)
    shadows = [ShadowLoader(ld) for ld in loaders]
    stream = []
    for step in range(n_steps_before):
        pl.ensure_buffered(60)
        p = pl.plan_step()
        stream.append(p.assignments[["source_id", "row_idx"]])
        for sh in shadows:
            sh.sync()
        ckpt.on_step(step, pl.checkpoint(), loaders)

    n_kill = max(1, int(kill_fraction * len(loaders)))
    killed = list(range(n_kill))
    for i in killed:
        loaders[i].fail()
    for i in killed:  # immediate shadow promotion
        promoted = shadows[i].promote()
        pl.loaders[i] = promoted
        loaders[i] = promoted

    for step in range(n_steps_before, n_steps_before + n_steps_after):
        pl.ensure_buffered(60)
        p = pl.plan_step()
        stream.append(p.assignments[["source_id", "row_idx"]])
        for sh in shadows:
            sh.sync()
        ckpt.on_step(step, pl.checkpoint(), loaders)
    got = pd.concat(stream, ignore_index=True)

    same = sorted(map(tuple, ref.to_numpy())) == sorted(map(tuple, got.to_numpy()))
    return {
        "killed": n_kill,
        "streams_identical": bool(same),
        "samples_delivered": int(len(got)),
        "duplicates": int(got.duplicated().sum()),
    }
