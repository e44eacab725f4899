"""E4 — source redundancy removal (§7.4, Fig. 15).

The loading-only benchmark: trainer disabled, TP=16, DP=2, batch size
32, context 32k; navit-100 vs navit_data across worker counts
{1, 2, 4, 8}, with OVERLORD either holding every source in one loader
group (SP=1) or uniformly partitioning the source set across the two DP
ranks (SP=2). The metric is total host memory of the loading service.

The measurement instantiates real :class:`SourceLoader` actors (buffers
filled with the per-step batch) rather than the analytic model alone,
so the per-worker file-state replication and the SP=2 halving are
observed, not assumed.
"""
from __future__ import annotations

from dataclasses import dataclass

from repro.core.source_loader import SourceLoader
from repro.data.sources import SourceSpec, navit_100, navit_lite

BATCH = 32
DP = 2


@dataclass(frozen=True)
class E4Row:
    dataset: str
    workers: int
    sp: int
    total_mem_gb: float
    n_loaders: int


def measure(
    specs: list[SourceSpec], *, workers: int, sp: int, buffered_per_source: int = 4
) -> E4Row:
    """Build the loader fleet for one configuration and sum its memory.

    With SP=``sp``, loader group g serves the sources with
    ``source_id % sp == g``; every group is replicated per DP rank's
    consumption but the *file states* exist once per group (the whole
    point of partitioning the source set).
    """
    if sp < 1:
        raise ValueError("sp must be >= 1")
    loaders: list[SourceLoader] = []
    for spec in specs:
        group = spec.source_id % sp
        ld = SourceLoader(spec, workers=workers, seed=group)
        ld.fill(buffered_per_source)
        loaders.append(ld)
    # SP=1: the single group's states are replicated for each DP rank's
    # loader; SP=sp: each DP rank hosts only its group's sources.
    replication = DP // sp if sp <= DP else 1
    total = sum(ld.memory_gb() for ld in loaders) * replication
    return E4Row(
        dataset="",
        workers=workers,
        sp=sp,
        total_mem_gb=total,
        n_loaders=len(loaders) * replication,
    )


def run_grid(
    *,
    worker_counts: tuple[int, ...] = (1, 2, 4, 8),
    sps: tuple[int, ...] = (1, 2),
) -> list[E4Row]:
    rows = []
    for name, specs in (("navit-100", navit_100()), ("navit_data", navit_lite())):
        for w in worker_counts:
            for sp in sps:
                r = measure(specs, workers=w, sp=sp)
                rows.append(
                    E4Row(name, r.workers, r.sp, r.total_mem_gb, r.n_loaders)
                )
    return rows
