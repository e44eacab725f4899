"""Tests for the memory cost model (E1/E3/E4 engine)."""
import pytest
from pyspark.sql import functions as F

from repro.core.autoscaler import ResourcePool, auto_partition
from repro.oracle import assert_equivalent
from repro.sim import memsim as MS
from repro.data.sources import coyo_lite, navit_lite


SPECS = coyo_lite()
BATCH_BYTES = 2e9  # 2 GB group batch


class TestClusterConfig:
    def test_world_and_dp(self):
        c = MS.ClusterConfig(n_nodes=18, tp=4, pp=4)
        assert c.world == 288 and c.dp == 18

    def test_loader_ranks_exclude_tp(self):
        c = MS.ClusterConfig(n_nodes=18, tp=4, pp=4)
        assert c.n_loader_ranks == 72  # dp * pp

    def test_indivisible_rejected(self):
        c = MS.ClusterConfig(n_nodes=1, gpus_per_node=10, tp=4)
        with pytest.raises(ValueError):
            _ = c.dp


class TestColocated:
    def test_per_node_memory(self, spark):
        c = MS.ClusterConfig(n_nodes=4, gpus_per_node=4, tp=1, pp=1)
        df = MS.colocated_memory(
            spark, SPECS, c, workers=2, batch_bytes_per_group=BATCH_BYTES
        )
        pdf = df.toPandas()
        assert len(pdf) == 4
        states = sum(s.file_state_gb for s in SPECS)
        per_instance = 2 * (MS.WORKER_BASE_GB + states) + 2 * BATCH_BYTES / 1e9
        # 4 loader instances per node (tp=pp=cp=1)
        assert pdf["mem_gb"].iloc[0] == pytest.approx(4 * per_instance)

    def test_worker_scaling(self, spark):
        c = MS.ClusterConfig(n_nodes=2, gpus_per_node=4)
        m1 = MS.avg_mem_per_node(
            MS.colocated_memory(spark, SPECS, c, workers=1, batch_bytes_per_group=0),
            2,
        )
        m4 = MS.avg_mem_per_node(
            MS.colocated_memory(spark, SPECS, c, workers=4, batch_bytes_per_group=0),
            2,
        )
        assert m4 == pytest.approx(4 * m1)

    def test_source_scaling_linear(self, spark):
        c = MS.ClusterConfig(n_nodes=2, gpus_per_node=4)
        few = MS.avg_mem_per_node(
            MS.colocated_memory(
                spark, navit_lite(20), c, workers=1, batch_bytes_per_group=0
            ),
            2,
        )
        many = MS.avg_mem_per_node(
            MS.colocated_memory(
                spark, navit_lite(40), c, workers=1, batch_bytes_per_group=0
            ),
            2,
        )
        assert many > few  # linear memory growth with sources (§2.3)

    def test_oracle(self, spark):
        c = MS.ClusterConfig(n_nodes=3, gpus_per_node=4, pp=2)
        df = MS.colocated_memory(
            spark, SPECS, c, workers=2, batch_bytes_per_group=BATCH_BYTES
        )
        states = sum(s.file_state_gb for s in SPECS)
        per_instance = 2 * (MS.WORKER_BASE_GB + states) + 2 * BATCH_BYTES / 1e9
        ranks = MS._loader_ranks_df(spark, c)
        assert_equivalent(
            df,
            f"SELECT node, count(*) * {per_instance} AS mem_gb "
            "FROM ranks GROUP BY node",
            ranks=ranks,
        )


class TestOverlord:
    def test_components_present(self, spark):
        c = MS.ClusterConfig(n_nodes=2, gpus_per_node=4)
        df = MS.overlord_memory(
            spark, SPECS, c, batch_bytes_per_group=BATCH_BYTES
        )
        comps = {r["component"] for r in df.select("component").distinct().collect()}
        assert comps == {"loader", "constructor", "planner"}

    def test_vanilla_one_actor_per_dp_group(self, spark):
        c = MS.ClusterConfig(n_nodes=2, gpus_per_node=4)  # dp=8
        df = MS.overlord_memory(spark, SPECS, c, batch_bytes_per_group=0)
        n_loaders = (
            df.filter(F.col("component") == "loader")
            .agg(F.sum("mem_gb").alias("t"))
            .collect()[0]["t"]
        )
        states = sum(s.file_state_gb for s in SPECS)
        one = MS.ACTOR_BASE_GB + 4 * MS.WORKER_BASE_GB + states
        assert n_loaders == pytest.approx(8 * one)

    def test_source_parallel_halves_states(self, spark):
        c = MS.ClusterConfig(n_nodes=2, gpus_per_node=4)
        full = MS.overlord_memory(spark, navit_lite(20), c, batch_bytes_per_group=0)
        half = MS.overlord_memory(
            spark, navit_lite(20), c, batch_bytes_per_group=0, sp=2
        )
        f = MS.avg_mem_per_node(full, 2)
        h = MS.avg_mem_per_node(half, 2)
        assert h < f

    def test_auto_configs_accepted(self, spark):
        c = MS.ClusterConfig(n_nodes=2, gpus_per_node=4)
        cfgs = auto_partition(SPECS, ResourcePool(64, 8.0))
        df = MS.overlord_memory(
            spark, SPECS, c, batch_bytes_per_group=0, configs=cfgs
        )
        assert MS.avg_mem_per_node(df, 2) > 0


class TestRatio:
    def test_overlord_saves_at_high_parallelism(self, spark):
        c = MS.ClusterConfig(n_nodes=8, gpus_per_node=16, tp=4, pp=4, cp=2)
        r = MS.memory_ratio(
            spark, SPECS, c, workers=4, batch_bytes_per_group=BATCH_BYTES
        )
        assert r < 0.5

    def test_marginal_overhead_at_low_parallelism(self, spark):
        # tp carries the loader-free ranks; with pp=cp=1 the colocated
        # loader count equals OVERLORD's actor count, so the constructor
        # buffer makes the ratio land near (or above) 1
        c = MS.ClusterConfig(n_nodes=8, gpus_per_node=16, tp=8, pp=1, cp=1)
        r = MS.memory_ratio(
            spark, SPECS, c, workers=1, batch_bytes_per_group=BATCH_BYTES
        )
        assert 0.8 < r

    def test_more_parallelism_more_savings(self, spark):
        base = dict(workers=4, batch_bytes_per_group=BATCH_BYTES)
        low = MS.memory_ratio(
            spark, SPECS, MS.ClusterConfig(8, 16, tp=8, pp=1, cp=1), **base
        )
        high = MS.memory_ratio(
            spark, SPECS, MS.ClusterConfig(8, 16, tp=8, pp=4, cp=2), **base
        )
        assert high < low
