"""E2 benchmark (Fig. 13): one representative orchestration column —
Llama-12B + ViT-2B on coyo700m at 8k context, all three strategies.
The full grid is produced by jobs/e2_orchestration.py."""
import pytest

from repro.experiments.e2_orchestration import run_cell


def _column(spark):
    out = {}
    for st in ("vanilla", "backbone", "hybrid"):
        out[st] = run_cell(
            spark,
            backbone="llama-12b",
            encoder="vit-2b",
            context_length=8192,
            dataset="coyo700m",
            strategy=st,
            n_steps=3,
        ).throughput
    return out

def test_e2_orchestration_column(benchmark, spark):
    tput = benchmark.pedantic(_column, args=(spark,), rounds=3, iterations=1)
    assert tput["hybrid"] > tput["vanilla"]
    assert tput["backbone"] > tput["vanilla"]
