"""E1 — data preprocessing architecture evaluation (§7.2, Fig. 12).

Llama-12B + ViT-2B on 288 GPUs (TP4 PP4) and 576 GPUs (TP4 PP4 CP4),
per-GPU batch 72, datasets navit-100 (colocated loader runs 4 workers)
and navit_data/306 (colocated fits only 1 worker per loader under the
1.8 TB/node limit). For each system we report:

- average memory per node (GB) from the memory cost model, and
- the per-iteration data-fetch time trace from the feed simulation
  (mean/std + a stability flag): the colocated loader at 576 GPUs
  fluctuates because its per-rank worker pool is under-provisioned, and
  OVERLORD-Vanilla's one-actor-per-DP-group pool cannot keep up at 576
  GPUs at all ("failed to continuously feed the data"), while
  OVERLORD-auto's per-source autoscaled pool stays stable.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np
from pyspark.sql import SparkSession

from repro.core.autoscaler import ResourcePool, auto_partition, total_cpu_demand
from repro.data.sources import SourceSpec, navit_100, navit_lite, sample_payload_bytes
from repro.data.sources import generate_source_rows
from repro.sim.memsim import (
    ClusterConfig,
    avg_mem_per_node,
    colocated_memory,
    overlord_memory,
)
from repro.sim.netsim import FeedTrace, demand_per_iteration_s, feed_simulation

SAMPLES_PER_GPU = 72
ITER_BUDGET_S = 20.0  # training iteration length the fetch must hide under
SIDECAR_CPUS_PER_NODE = 64  # half of the host cores go to the sidecar pool
VANILLA_WORKERS = 16  # workers per all-source OVERLORD-Vanilla actor


@dataclass(frozen=True)
class E1Row:
    """One Fig. 12 bar: (system, gpus, dataset) → memory + fetch."""

    system: str
    n_gpus: int
    dataset: str
    mem_per_node_gb: float
    fetch_mean_s: float
    fetch_std_s: float
    feeds_ok: bool


def _avg_sample_bytes(specs: list[SourceSpec]) -> float:
    probe = np.concatenate(
        [
            sample_payload_bytes(
                generate_source_rows(s, 0, 64)["text_len"],
                generate_source_rows(s, 0, 64)["image_patches"],
            )
            for s in specs[: min(32, len(specs))]
        ]
    )
    return float(probe.mean())


def run_config(
    spark: SparkSession,
    *,
    n_gpus: int,
    dataset: str,
    n_iters: int = 100,
    seed: int = 0,
) -> list[E1Row]:
    """All three systems for one (gpus, dataset) panel of Fig. 12."""
    if n_gpus == 288:
        cluster = ClusterConfig(n_nodes=18, tp=4, pp=4)
    elif n_gpus == 576:
        cluster = ClusterConfig(n_nodes=36, tp=4, pp=4, cp=4)
    else:
        raise ValueError("Fig. 12 evaluates 288 and 576 GPUs")
    if dataset == "navit-100":
        specs, colo_workers = navit_100(), 4
    elif dataset == "navit_data":
        specs, colo_workers = navit_lite(), 1
    else:
        raise ValueError("dataset must be navit-100 or navit_data")

    weights = np.array([s.weight for s in specs])
    group_gpus = cluster.world // cluster.dp
    group_batch = SAMPLES_PER_GPU * group_gpus
    batch_bytes = group_batch * _avg_sample_bytes(specs)
    global_samples_per_iter = SAMPLES_PER_GPU * cluster.world
    demand = demand_per_iteration_s(specs, weights, global_samples_per_iter)

    pool = ResourcePool(
        total_cpus=cluster.n_nodes * SIDECAR_CPUS_PER_NODE,
        per_actor_mem_gb=32.0,
    )
    auto_cfgs = auto_partition(specs, pool)

    rows: list[E1Row] = []

    def feed(demand_s: float, n_workers: int, label_seed: int) -> FeedTrace:
        return feed_simulation(
            demand_s=demand_s,
            n_workers=max(1, n_workers),
            iter_budget_s=ITER_BUDGET_S,
            n_iters=n_iters,
            seed=seed + label_seed,
        )

    # Colocated: one loader per (DP,CP,PP) rank, each with colo_workers
    # reader processes. Every CP rank of a group transforms the complete
    # group batch (Fig. 6's redundancy), so transform demand is
    # multiplied by the CP degree — the mechanism behind the 576-GPU
    # fetch fluctuations.
    colo_mem = avg_mem_per_node(
        colocated_memory(
            spark,
            specs,
            cluster,
            workers=colo_workers,
            batch_bytes_per_group=batch_bytes,
        ),
        cluster.n_nodes,
    )
    tr = feed(demand * cluster.cp, cluster.n_loader_ranks * colo_workers, 1)
    rows.append(
        E1Row("colocated", n_gpus, dataset, colo_mem, tr.mean, tr.std, tr.stable)
    )

    # OVERLORD-Vanilla: one all-source actor per DP group. Its worker
    # pool scales with DP, so at 576 GPUs (DP shrinks from 18 to 9 while
    # data volume doubles) it cannot keep up — the paper's "failed to
    # continuously feed the data".
    van_mem = avg_mem_per_node(
        overlord_memory(
            spark,
            specs,
            cluster,
            batch_bytes_per_group=batch_bytes,
            vanilla_workers=VANILLA_WORKERS,
        ),
        cluster.n_nodes,
    )
    tr = feed(demand, cluster.dp * VANILLA_WORKERS, 2)
    rows.append(
        E1Row("overlord-vanilla", n_gpus, dataset, van_mem, tr.mean, tr.std, tr.stable)
    )

    # OVERLORD-auto: per-source autoscaled actors.
    auto_mem = avg_mem_per_node(
        overlord_memory(
            spark,
            specs,
            cluster,
            batch_bytes_per_group=batch_bytes,
            configs=auto_cfgs,
        ),
        cluster.n_nodes,
    )
    tr = feed(demand, total_cpu_demand(auto_cfgs), 3)
    rows.append(
        E1Row("overlord-auto", n_gpus, dataset, auto_mem, tr.mean, tr.std, tr.stable)
    )
    return rows


def run_all(spark: SparkSession, **kwargs) -> list[E1Row]:
    rows = []
    for n_gpus in (288, 576):
        for dataset in ("navit-100", "navit_data"):
            rows.extend(run_config(spark, n_gpus=n_gpus, dataset=dataset, **kwargs))
    return rows


def reduction_factors(rows: list[E1Row]) -> dict[tuple[int, str], float]:
    """(gpus, dataset) → colocated/best-OVERLORD memory ratio (the
    paper's headline is 'up to 13.5x')."""
    out = {}
    for n_gpus in sorted({r.n_gpus for r in rows}):
        for ds in sorted({r.dataset for r in rows}):
            sub = {r.system: r for r in rows if r.n_gpus == n_gpus and r.dataset == ds}
            if "colocated" in sub:
                best = min(
                    v.mem_per_node_gb
                    for k, v in sub.items()
                    if k != "colocated"
                )
                out[(n_gpus, ds)] = sub["colocated"].mem_per_node_gb / best
    return out
