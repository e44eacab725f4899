"""Memory cost model: colocated vs OVERLORD deployments (E1/E3/E4).

The paper's memory claims rest on *where file access states and batch
buffers are replicated*:

- **Colocated** (Megatron-style): a loader instance exists on every
  (DP, CP, PP) rank — TP>0 ranks receive via broadcast, so TP carries
  no loader (Fig. 6 shows CP/PP redundancy). Every loader runs ``W``
  worker *processes*, and each worker process holds an independent file
  access state for **every** source (§2.3 Source Scaling), plus the
  instance prefetch-buffers its whole DP-group batch (parallelism
  redundancy: CP/PP ranks re-buffer the same batch).
- **OVERLORD-Vanilla**: actor-model preprocessing without source
  partitioning — one loader actor per DP group whose workers share the
  actor's file states (the actor holds all sources once), plus one Data
  Constructor per DP group and a Planner.
- **OVERLORD-auto**: per-source loader actors from the AutoScaler
  (§5.1); each actor holds only its own source's state. Source
  Parallelism (``sp``) in E4 instead partitions the *source set* across
  ``sp`` loader groups so each worker holds ``S/sp`` source states.

The (node × client × worker × source) expansion is materialised as
Spark DataFrames and aggregated; tests diff the aggregation against
DuckDB SQL over the same base tables via the oracle.
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import Sequence

import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from repro.core.autoscaler import LoaderConfig
from repro.core.constructor import CONSTRUCTOR_BASE_GB
from repro.core.source_loader import WORKER_BASE_GB
from repro.data.sources import SourceSpec

#: actor-process overhead (Ray actor + Python runtime), GB
ACTOR_BASE_GB = 0.6
#: planner actor resident memory, GB
PLANNER_GB = 2.0
#: prefetch depth (in-flight batch copies) for loader/constructor buffers
PREFETCH = 2


@dataclass(frozen=True)
class ClusterConfig:
    """Trainer cluster geometry. ``dp`` is derived: world / (tp*pp*cp)."""

    n_nodes: int
    gpus_per_node: int = 16
    tp: int = 1
    pp: int = 1
    cp: int = 1

    @property
    def world(self) -> int:
        return self.n_nodes * self.gpus_per_node

    @property
    def dp(self) -> int:
        denom = self.tp * self.pp * self.cp
        if self.world % denom != 0:
            raise ValueError(f"world {self.world} not divisible by tp*pp*cp={denom}")
        return self.world // denom

    @property
    def n_loader_ranks(self) -> int:
        """Ranks carrying a colocated loader instance: DP x CP x PP
        (TP rank 0 broadcasts within its TP group)."""
        return self.dp * self.cp * self.pp


def _sources_df(spark: SparkSession, specs: Sequence[SourceSpec]) -> DataFrame:
    pdf = pd.DataFrame(
        {
            "source_id": [s.source_id for s in specs],
            "file_state_gb": [s.file_state_gb for s in specs],
        }
    )
    return spark.createDataFrame(pdf)


def _loader_ranks_df(spark: SparkSession, cluster: ClusterConfig) -> DataFrame:
    """One row per colocated loader instance, with its hosting node."""
    n = cluster.n_loader_ranks
    stride = cluster.world / n  # loader ranks spread uniformly over GPUs
    return spark.range(n).select(
        F.col("id").alias("loader_rank"),
        (
            (F.col("id") * F.lit(float(stride))).cast("long")
            / F.lit(cluster.gpus_per_node)
        )
        .cast("int")
        .alias("node"),
    )


def colocated_memory(
    spark: SparkSession,
    specs: Sequence[SourceSpec],
    cluster: ClusterConfig,
    *,
    workers: int,
    batch_bytes_per_group: float,
    prefetch: int = PREFETCH,
) -> DataFrame:
    """Per-node memory (GB) of the colocated baseline.

    node → mem_gb = sum over hosted loader instances of
    ``workers * (WORKER_BASE + sum_s m_d(s)) + prefetch * group_batch``.
    """
    ranks = _loader_ranks_df(spark, cluster)
    per_worker_states = _sources_df(spark, specs).agg(
        F.sum("file_state_gb").alias("states_gb")
    )
    per_instance = ranks.crossJoin(per_worker_states).select(
        "node",
        (
            F.lit(float(workers)) * (F.lit(WORKER_BASE_GB) + F.col("states_gb"))
            + F.lit(prefetch * batch_bytes_per_group / 1e9)
        ).alias("mem_gb"),
    )
    return per_instance.groupBy("node").agg(F.sum("mem_gb").alias("mem_gb"))


def overlord_memory(
    spark: SparkSession,
    specs: Sequence[SourceSpec],
    cluster: ClusterConfig,
    *,
    batch_bytes_per_group: float,
    configs: Sequence[LoaderConfig] | None = None,
    vanilla_workers: int = 4,
    sp: int = 1,
    prefetch: int = PREFETCH,
    worker_process_states: bool = False,
) -> DataFrame:
    """Per-node, per-component memory (GB) of an OVERLORD deployment.

    ``configs=None`` → Vanilla (one all-source actor per DP group with
    ``vanilla_workers`` workers, the source set optionally partitioned
    across ``sp`` groups); otherwise the AutoScaler's per-source actor
    configs. Components: 'loader', 'constructor', 'planner'.
    Actors round-robin over nodes (sidecar deployment, §6.2).

    ``worker_process_states=False`` (real OVERLORD) holds file states
    once per actor — its workers only transform. ``True`` replicates
    states per worker like a colocated PyTorch loader; Fig. 14's
    dry-run ablation uses this parity mode so the ratio isolates
    *parallelism* redundancy alone.
    """
    n_nodes = cluster.n_nodes
    rows: list[tuple[int, str, float]] = []

    def actor_mem(workers: int, states: float) -> float:
        if worker_process_states:
            return ACTOR_BASE_GB + workers * (WORKER_BASE_GB + states)
        return ACTOR_BASE_GB + workers * WORKER_BASE_GB + states

    if configs is None:
        # Vanilla: dp actors; actor i of a DP group serves the sources
        # with source_id % sp == (i % sp) when source-parallel is on.
        total_states = sum(s.file_state_gb for s in specs)
        for i in range(cluster.dp):
            share = (
                sum(s.file_state_gb for s in specs if s.source_id % sp == i % sp)
                if sp > 1
                else total_states
            )
            rows.append((i % n_nodes, "loader", actor_mem(vanilla_workers, share)))
    else:
        by_id = {s.source_id: s for s in specs}
        slot = 0
        for cfg in configs:
            spec = by_id[cfg.source_id]
            for a in range(cfg.n_actors):
                share = spec.file_state_gb / cfg.n_actors + 0.005
                rows.append(
                    (slot % n_nodes, "loader", actor_mem(cfg.workers_per_actor, share))
                )
                slot += 1

    # one constructor per DP group: base + prefetch in-flight batch copies
    # + one staging copy for cross-node communication
    c_mem = CONSTRUCTOR_BASE_GB + (prefetch + 1) * batch_bytes_per_group / 1e9
    for b in range(cluster.dp):
        rows.append((b % n_nodes, "constructor", c_mem))
    rows.append((0, "planner", PLANNER_GB))

    pdf = pd.DataFrame(rows, columns=["node", "component", "mem_gb"])
    return (
        spark.createDataFrame(pdf)
        .groupBy("node", "component")
        .agg(F.sum("mem_gb").alias("mem_gb"))
    )


def avg_mem_per_node(df: DataFrame, n_nodes: int) -> float:
    """Cluster-wide average memory per node (empty nodes count)."""
    total = df.agg(F.sum("mem_gb").alias("t")).collect()[0]["t"]
    return float(total or 0.0) / n_nodes


def memory_ratio(
    spark: SparkSession,
    specs: Sequence[SourceSpec],
    cluster: ClusterConfig,
    *,
    workers: int,
    batch_bytes_per_group: float,
    configs: Sequence[LoaderConfig] | None = None,
    vanilla_workers: int | None = None,
    worker_process_states: bool = True,
) -> float:
    """Fig. 14's metric: OVERLORD total memory / Colocated total memory
    (< 1 means OVERLORD saves memory). Defaults to the dry-run parity
    mode (identical per-loader job memory on both sides) so the ratio
    isolates parallelism redundancy, as in the paper's ablation."""
    colo = colocated_memory(
        spark,
        specs,
        cluster,
        workers=workers,
        batch_bytes_per_group=batch_bytes_per_group,
    )
    over = overlord_memory(
        spark,
        specs,
        cluster,
        batch_bytes_per_group=batch_bytes_per_group,
        configs=configs,
        vanilla_workers=vanilla_workers if vanilla_workers is not None else workers,
        worker_process_states=worker_process_states,
    )
    c = avg_mem_per_node(colo, cluster.n_nodes)
    o = avg_mem_per_node(over, cluster.n_nodes)
    return o / c
