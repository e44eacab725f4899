"""End-to-end integration: Parquet sources → Source Loaders → Planner →
Data Constructors → per-client payloads (the §3 workflow), with oracle
checks on delivery correctness."""
import numpy as np
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.core.constructor import DataConstructor, zigzag_cp_shards
from repro.core.dgraph import DGraph, with_sample_id
from repro.core.placetree import ClientPlaceTree
from repro.core.planner import Planner
from repro.core.source_loader import SourceLoader
from repro.data.mixture import ConstantSchedule
from repro.data.sources import coyo_lite, generate_samples, write_parquet_sources
from repro.oracle import assert_equivalent
from repro.sim.models import BACKBONES
from repro.sim.models import sample_backbone_cost

SPECS = coyo_lite()
CTX = 2048


@pytest.fixture(scope="module")
def parquet_paths(spark, tmp_path_factory):
    base = tmp_path_factory.mktemp("sources")
    return write_parquet_sources(spark, SPECS, str(base), rows_per_source=120, seed=9)


def make_planner(loaders, dp=2, n_mb=2, method="karmarkar_karp"):
    tree = ClientPlaceTree.from_degrees(dp=dp)
    sched = ConstantSchedule([1.0] * len(SPECS))
    cfg = BACKBONES["llama-12b"]

    def cost_fn(pdf):
        return sample_backbone_cost(
            cfg, pdf["text_len"].to_numpy(), pdf["image_patches"].to_numpy()
        )

    return Planner(
        loaders,
        tree,
        sched,
        batch_size=40,
        n_microbatches=n_mb,
        cost_fn=cost_fn,
        method=method,
    )


class TestParquetLoaders:
    def test_loader_reads_parquet_range(self, spark, parquet_paths):
        spec = SPECS[0]
        ld = SourceLoader(spec, spark=spark, path=parquet_paths[spec.name])
        assert ld.fill(10) == 10
        assert list(ld.summary_buffer()["row_idx"]) == list(range(10))

    def test_parquet_matches_synthetic_loader(self, spark, parquet_paths):
        spec = SPECS[1]
        pq = SourceLoader(spec, spark=spark, path=parquet_paths[spec.name], seed=9)
        sy = SourceLoader(spec, seed=9)
        pq.fill(15)
        sy.fill(15)
        pd.testing.assert_frame_equal(
            pq.summary_buffer().reset_index(drop=True),
            sy.summary_buffer().reset_index(drop=True),
            check_dtype=False,
        )

    def test_sharded_parquet_loaders(self, spark, parquet_paths):
        spec = SPECS[2]
        shards = [
            SourceLoader(
                spec, spark=spark, path=parquet_paths[spec.name], shard=i, n_shards=2
            )
            for i in range(2)
        ]
        for s in shards:
            s.fill(5)
        rows = sorted(
            r for s in shards for r in s.summary_buffer()["row_idx"].tolist()
        )
        assert rows == list(range(10))


class TestPlannerWorkflow:
    def _loaders(self, seed=9):
        return [SourceLoader(s, seed=seed, buffer_capacity=512) for s in SPECS]

    def test_plan_step_exact_batch(self):
        pl = make_planner(self._loaders())
        pl.ensure_buffered(20)
        plan = pl.plan_step()
        assert plan.n_samples == 40

    def test_planned_rows_staged(self):
        loaders = self._loaders()
        pl = make_planner(loaders)
        pl.ensure_buffered(20)
        plan = pl.plan_step()
        staged = pd.concat([ld.pop_staged() for ld in loaders], ignore_index=True)
        assert sorted(zip(staged["source_id"], staged["row_idx"])) == sorted(
            zip(plan.assignments["source_id"], plan.assignments["row_idx"])
        )

    def test_consecutive_steps_disjoint(self):
        loaders = self._loaders()
        pl = make_planner(loaders)
        pl.ensure_buffered(40)
        p1 = pl.plan_step()
        pl.ensure_buffered(40)
        p2 = pl.plan_step()
        k1 = set(zip(p1.assignments["source_id"], p1.assignments["row_idx"]))
        k2 = set(zip(p2.assignments["source_id"], p2.assignments["row_idx"]))
        assert not (k1 & k2)

    def test_balanced_buckets(self):
        pl = make_planner(self._loaders(), dp=4)
        pl.ensure_buffered(40)
        plan = pl.plan_step()
        loads = plan.assignments.groupby("bucket")["cost"].sum()
        # within 5% of the lower bound (a single heavy-tailed sample can
        # exceed the mean bucket load, so 1.0 is not always reachable)
        lower = max(plan.assignments["cost"].max(), loads.mean()) / loads.mean()
        assert loads.max() / loads.mean() <= lower * 1.05

    def test_vanilla_method_none(self):
        loaders = self._loaders()
        pl = make_planner(loaders)
        pl.method = None
        pl.ensure_buffered(20)
        plan = pl.plan_step()
        counts = plan.assignments.groupby("bucket").size()
        assert counts.max() - counts.min() <= 1

    def test_scale_triggers_from_schedule(self):
        loaders = self._loaders()
        tree = ClientPlaceTree.from_degrees(dp=2)
        sched = ConstantSchedule([0.9, 0.025, 0.025, 0.025, 0.025])
        pl = Planner(
            loaders, tree, sched, batch_size=40,
            hi_threshold=0.5, lo_threshold=0.03,
        )
        for _ in range(4):
            pl.ensure_buffered(60)
            pl.plan_step()
        trig = pl.scale_triggers(patience=3)
        assert trig.get(0) == 1  # dominant source scales up
        assert all(trig.get(i) == -1 for i in range(1, 5))  # idle reclaimed

    def test_checkpoint_roundtrip(self):
        pl = make_planner(self._loaders())
        pl.ensure_buffered(20)
        pl.plan_step()
        ck = pl.checkpoint()
        pl2 = make_planner(self._loaders())
        pl2.restore(ck)
        assert pl2.step == 1

    def test_empty_buffer_raises(self):
        pl = make_planner(self._loaders())
        with pytest.raises(RuntimeError):
            pl.plan_step()


class TestConstructor:
    def _loading_plan(self, spark, dp=2, cp=1, pp=1, tp=1, n_mb=2, broadcast=()):
        tree = ClientPlaceTree.from_degrees(dp=dp, cp=cp, pp=pp, tp=tp)
        df = generate_samples(spark, SPECS, rows_per_source=40, seed=5)
        df = with_sample_id(df).withColumn("step", F.lit(0))
        g = DGraph.from_buffer(df, ["text_len", "image_patches"]).distribute(
            "DP", tree, n_microbatches=n_mb
        )
        for d in broadcast:
            g = g.broadcast_at(d)
        return g.plan()

    def test_microbatches_cover_bucket(self, spark):
        plan = self._loading_plan(spark)
        staged = plan.to_pandas()
        dc = DataConstructor(0, plan, CTX)
        mbs = dc.build_microbatches(staged)
        n = sum(len(m.sample_rows) for m in mbs)
        assert n == (staged["bucket"] == 0).sum()

    def test_sequences_respect_capacity(self, spark):
        plan = self._loading_plan(spark)
        dc = DataConstructor(0, plan, CTX)
        for m in dc.build_microbatches(plan.to_pandas()):
            for s in m.sequences:
                assert s.used <= CTX

    def test_padding_accounted(self, spark):
        plan = self._loading_plan(spark)
        dc = DataConstructor(1, plan, CTX)
        for m in dc.build_microbatches(plan.to_pandas()):
            assert m.padded_tokens == m.n_sequences * CTX - m.total_tokens

    def test_cp_clients_get_shards(self, spark):
        plan = self._loading_plan(spark, cp=2)
        dc = DataConstructor(0, plan, CTX)
        mb = dc.build_microbatches(plan.to_pandas())[0]
        payloads = dc.client_payloads(mb)
        kinds = {p.kind for p in payloads.values()}
        assert kinds == {"shard"}
        # CP shards partition the token range
        ranges = sorted(
            r for p in payloads.values() for r in p.token_ranges
        )
        covered = sum(b - a for a, b in ranges)
        assert covered == CTX

    def test_pp_metadata_payload(self, spark):
        plan = self._loading_plan(spark, pp=2)
        dc = DataConstructor(0, plan, CTX)
        mb = dc.build_microbatches(plan.to_pandas())[0]
        payloads = dc.client_payloads(mb)
        kinds = {
            plan.tree.clients[r].coords["PP"]: p.kind for r, p in payloads.items()
        }
        assert kinds[0] == "full" and kinds[1] == "metadata"

    def test_broadcast_excludes_tp(self, spark):
        plan = self._loading_plan(spark, tp=2, broadcast=("TP",))
        dc = DataConstructor(0, plan, CTX)
        mb = dc.build_microbatches(plan.to_pandas())[0]
        payloads = dc.client_payloads(mb)
        assert all(
            plan.tree.clients[r].coords["TP"] == 0 for r in payloads
        )

    def test_memory_scales_with_batch(self, spark):
        plan = self._loading_plan(spark)
        dc = DataConstructor(0, plan, CTX)
        staged = plan.to_pandas()
        assert dc.memory_gb(staged) > dc.memory_gb(staged.iloc[0:0])

    def test_zigzag_shards(self):
        shards = zigzag_cp_shards(8, 2)
        assert shards == [[(0, 2), (6, 8)], [(2, 4), (4, 6)]]

    def test_zigzag_rejects_indivisible(self):
        with pytest.raises(ValueError):
            zigzag_cp_shards(10, 4)


class TestDeliveryOracle:
    def test_every_sample_delivered_exactly_once(self, spark):
        """The core correctness claim: disaggregation delivers each
        admitted sample to exactly one (bucket, microbatch)."""
        tree = ClientPlaceTree.from_degrees(dp=4)
        df = generate_samples(spark, SPECS, rows_per_source=60, seed=11)
        df = with_sample_id(df).withColumn(
            "step", (F.col("row_idx") % 2).cast("int")
        )
        plan = (
            DGraph.from_buffer(df, ["text_len", "image_patches"])
            .distribute("DP", tree, n_microbatches=2)
            .plan()
        )
        per_sample = plan.assignments.groupBy("sample_id").agg(
            F.count("*").alias("n")
        )
        assert_equivalent(
            per_sample,
            "SELECT sample_id, count(*) AS n FROM plan GROUP BY sample_id",
            plan=plan.assignments,
        )
        assert per_sample.filter(F.col("n") != 1).count() == 0
        assert per_sample.count() == df.count()

    def test_token_conservation_through_pipeline(self, spark):
        tree = ClientPlaceTree.from_degrees(dp=2)
        df = generate_samples(spark, SPECS, rows_per_source=30, seed=12)
        df = with_sample_id(df).withColumn("step", F.lit(0))
        plan = (
            DGraph.from_buffer(df, ["text_len", "image_patches"])
            .distribute("DP", tree, n_microbatches=2)
            .plan()
        )
        staged = plan.to_pandas()
        # packing truncates fused sequences at the context capacity (the
        # crop behaviour), so conservation holds on clipped lengths
        fused = (staged["text_len"] + staged["image_patches"]).clip(upper=CTX)
        total_in = int(fused.sum())
        total_out = 0
        for b in range(2):
            dc = DataConstructor(b, plan, CTX)
            for m in dc.build_microbatches(staged):
                total_out += m.total_tokens
        assert total_out == total_in
