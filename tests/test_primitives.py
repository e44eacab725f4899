"""Tests for Fig. 9 orchestration strategies and plan merging."""
import pytest
from pyspark.sql import functions as F

from repro.core.dgraph import with_sample_id
from repro.core.placetree import ClientPlaceTree
from repro.core.primitives import (
    encoder_balance,
    llm_balance,
    merge_plans,
    vanilla_plan,
    vlm_hybrid_balance,
)
from repro.data.mixture import ConstantSchedule
from repro.data.sources import coyo_lite, generate_samples
from repro.sim.models import BACKBONES, ENCODERS


@pytest.fixture(scope="module")
def buffer_df(spark):
    specs = coyo_lite()
    df = generate_samples(spark, specs, rows_per_source=200, seed=4)
    return (
        with_sample_id(df)
        .withColumn("step", (F.col("row_idx") % 2).cast("int"))
        .cache()
    )


TREE = ClientPlaceTree.from_degrees(pp=1, dp=4, cp=1, tp=1)
LLAMA = BACKBONES["llama-12b"]
VIT = ENCODERS["vit-1b"]


def _spread(pdf, bucket_col, cost_col):
    loads = pdf.groupby(["step", bucket_col])[cost_col].sum()
    return float((loads.groupby("step").max() / loads.groupby("step").mean()).mean())


class TestLLMBalance:
    def test_balances_backbone_cost(self, buffer_df):
        plan = llm_balance(buffer_df, TREE, LLAMA, n_microbatches=2)
        pdf = plan.to_pandas()
        assert _spread(pdf, "bucket", "cost") < 1.1

    def test_tp_broadcast_declared(self, buffer_df):
        tree = ClientPlaceTree.from_degrees(dp=2, tp=2)
        plan = llm_balance(buffer_df, tree, LLAMA)
        assert plan.broadcast_dims == ("TP",)

    def test_no_tp_no_broadcast(self, buffer_df):
        plan = llm_balance(buffer_df, TREE, LLAMA)
        assert plan.broadcast_dims == ()

    def test_mix_needs_batch_size(self, buffer_df):
        with pytest.raises(ValueError):
            llm_balance(buffer_df, TREE, LLAMA, schedule=ConstantSchedule([1] * 5))


class TestEncoderBalance:
    def test_world_axis(self, buffer_df):
        plan = encoder_balance(buffer_df, TREE, VIT)
        assert plan.axis == "WORLD"
        assert plan.n_buckets == TREE.world_size

    def test_balances_encoder_cost(self, buffer_df):
        plan = encoder_balance(buffer_df, TREE, VIT, n_microbatches=2)
        assert _spread(plan.to_pandas(), "bucket", "cost") < 1.1


class TestVanilla:
    def test_no_cost_column_information(self, buffer_df):
        plan = vanilla_plan(buffer_df, TREE, n_microbatches=2)
        pdf = plan.to_pandas()
        assert (pdf["cost"] == 1.0).all()  # no cost model registered

    def test_round_robin_counts(self, buffer_df):
        plan = vanilla_plan(buffer_df, TREE)
        counts = plan.to_pandas().groupby(["step", "bucket"]).size()
        assert counts.max() - counts.min() <= 2


class TestMerge:
    def test_merge_preserves_samples(self, buffer_df):
        llm = llm_balance(buffer_df, TREE, LLAMA, n_microbatches=2)
        admitted = llm.assignments.select(
            "sample_id", "source_id", "row_idx", "step", "image_patches"
        )
        enc = encoder_balance(admitted, TREE, VIT, n_microbatches=2)
        merged = merge_plans(llm, enc)
        assert merged.count() == llm.assignments.count()

    def test_merged_columns(self, buffer_df):
        merged = vlm_hybrid_balance(
            buffer_df, TREE, LLAMA, VIT, n_microbatches=2
        )
        cols = set(merged.columns)
        assert {"llm_bucket", "llm_mb", "enc_bucket", "enc_mb"} <= cols

    def test_hybrid_balances_both_modules(self, buffer_df):
        merged = vlm_hybrid_balance(
            buffer_df, TREE, LLAMA, VIT, n_microbatches=2
        ).toPandas()
        assert _spread(merged, "llm_bucket", "llm_cost") < 1.1
        assert _spread(merged, "enc_bucket", "enc_cost") < 1.1

    def test_hybrid_with_mix(self, buffer_df):
        sched = ConstantSchedule([1, 1, 1, 1, 1])
        merged = vlm_hybrid_balance(
            buffer_df, TREE, LLAMA, VIT, schedule=sched, batch_size=60
        ).toPandas()
        assert (merged.groupby("step").size() == 60).all()
