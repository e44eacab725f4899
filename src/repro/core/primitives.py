"""Ready-made orchestration strategies (Fig. 9) and plan combination.

The paper shows two worked strategies built from the primitives:

- ``llm_balance`` — unimodal long-short-sequence balancing across DP
  ranks with a token-count cost model (seven lines in the paper).
- ``vlm_hybrid_balance`` — the multimodal extension: an image DGraph is
  derived from the *same* buffer with different metadata, distributed
  world-wide for the encoder, balanced, then combined with the LLM plan
  (five additional lines in the paper).

``merge_plans`` joins a backbone plan and an encoder plan on
``sample_id`` into one routing table with separate (bucket, mb) columns
per module — the Data Constructor routes text/fused sequences by the
``llm_*`` columns and raw images by the ``enc_*`` columns.
"""
from __future__ import annotations

from typing import Callable

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame

from repro.core.dgraph import DGraph, LoadingPlan
from repro.core.placetree import AXIS_WORLD, ClientPlaceTree
from repro.data.mixture import MixSchedule
from repro.sim.models import ModelConfig, sample_backbone_cost, sample_encoder_cost


def llm_cost_fn(cfg: ModelConfig) -> Callable[[pd.DataFrame], np.ndarray]:
    """Backbone cost over fused (text + image-token) sequence length —
    quadratic in tokens, the paper's suggested backbone cost model."""

    def fn(pdf: pd.DataFrame) -> np.ndarray:
        img = (
            pdf["image_patches"].to_numpy()
            if "image_patches" in pdf.columns
            else np.zeros(len(pdf))
        )
        return sample_backbone_cost(cfg, pdf["text_len"].to_numpy(), img)

    return fn


def encoder_cost_fn(cfg: ModelConfig) -> Callable[[pd.DataFrame], np.ndarray]:
    """Encoder cost over per-image patch counts."""

    def fn(pdf: pd.DataFrame) -> np.ndarray:
        return sample_encoder_cost(cfg, pdf["image_patches"].to_numpy())

    return fn


def llm_balance(
    buffer_df: DataFrame,
    tree: ClientPlaceTree,
    backbone: ModelConfig,
    *,
    schedule: MixSchedule | None = None,
    batch_size: int | None = None,
    n_microbatches: int = 1,
    method: str = "karmarkar_karp",
    broadcast_tp: bool = True,
    intra_reorder: bool = True,
) -> LoadingPlan:
    """Fig. 9's unimodal strategy: distribute along DP, cost by fused
    token count, balance inter-microbatch, broadcast at TP."""
    g = DGraph.from_buffer(buffer_df, fields=["text_len", "image_patches"])
    if schedule is not None:
        if batch_size is None:
            raise ValueError("mix() needs a batch_size")
        g = g.mix(schedule, batch_size)
    g = g.distribute("DP", tree, n_microbatches=n_microbatches)
    g = g.cost(llm_cost_fn(backbone))
    g = g.balance(method, intra_reorder=intra_reorder)
    if broadcast_tp and tree.dims.get("TP", 1) > 1:
        g = g.broadcast_at("TP")
    return g.plan()


def encoder_balance(
    buffer_df: DataFrame,
    tree: ClientPlaceTree,
    encoder: ModelConfig,
    *,
    schedule: MixSchedule | None = None,
    batch_size: int | None = None,
    n_microbatches: int = 1,
    method: str = "karmarkar_karp",
) -> LoadingPlan:
    """Interleaved image balancing for the encoder: images distributed
    across all ranks (world-wide data parallelism) and balanced by
    per-image encoder cost."""
    g = DGraph.from_buffer(buffer_df, fields=["image_patches"])
    if schedule is not None:
        if batch_size is None:
            raise ValueError("mix() needs a batch_size")
        g = g.mix(schedule, batch_size)
    g = g.distribute(AXIS_WORLD, tree, n_microbatches=n_microbatches)
    g = g.cost(encoder_cost_fn(encoder))
    g = g.balance(method)
    return g.plan()


def vanilla_plan(
    buffer_df: DataFrame,
    tree: ClientPlaceTree,
    *,
    schedule: MixSchedule | None = None,
    batch_size: int | None = None,
    n_microbatches: int = 1,
    axis: str = "DP",
) -> LoadingPlan:
    """No scheduling: samples assigned round-robin in arrival order —
    the paper's Vanilla baseline."""
    g = DGraph.from_buffer(buffer_df, fields=["text_len", "image_patches"])
    if schedule is not None:
        if batch_size is None:
            raise ValueError("mix() needs a batch_size")
        g = g.mix(schedule, batch_size)
    g = g.distribute(axis, tree, n_microbatches=n_microbatches)
    return g.plan()


def merge_plans(llm: LoadingPlan, enc: LoadingPlan) -> DataFrame:
    """Join backbone and encoder plans on sample_id into one routing
    table: (sample keys, metadata, llm_bucket, llm_mb, llm_cost,
    enc_bucket, enc_mb, enc_cost)."""
    l = llm.assignments.select(
        "sample_id",
        "source_id",
        "row_idx",
        "step",
        "text_len",
        "image_patches",
        llm.assignments["cost"].alias("llm_cost"),
        llm.assignments["bucket"].alias("llm_bucket"),
        llm.assignments["mb"].alias("llm_mb"),
    )
    e = enc.assignments.select(
        "sample_id",
        enc.assignments["cost"].alias("enc_cost"),
        enc.assignments["bucket"].alias("enc_bucket"),
        enc.assignments["mb"].alias("enc_mb"),
    )
    return l.join(e, on="sample_id", how="inner")


def vlm_hybrid_balance(
    buffer_df: DataFrame,
    tree: ClientPlaceTree,
    backbone: ModelConfig,
    encoder: ModelConfig,
    *,
    schedule: MixSchedule | None = None,
    batch_size: int | None = None,
    n_microbatches: int = 1,
    method: str = "karmarkar_karp",
) -> DataFrame:
    """Fig. 9's multimodal strategy: balance images for the encoder and
    fused sequences for the backbone, then combine into a global plan."""
    llm = llm_balance(
        buffer_df,
        tree,
        backbone,
        schedule=schedule,
        batch_size=batch_size,
        n_microbatches=n_microbatches,
        method=method,
    )
    # the image DGraph must see exactly the samples the LLM plan admitted
    admitted = llm.assignments.select(
        "sample_id", "source_id", "row_idx", "step", "image_patches"
    )
    enc = encoder_balance(
        admitted, tree, encoder, n_microbatches=n_microbatches, method=method
    )
    return merge_plans(llm, enc)
