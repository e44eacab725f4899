"""E2 (Fig. 13): end-to-end orchestration throughput across context
lengths, dataset groups, and model sizes; Vanilla vs Backbone balance vs
Hybrid balance.

Run: spark-submit jobs/e2_orchestration.py [--quick]
"""
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).parent))
from _session import get_session, print_table  # noqa: E402

import numpy as np  # noqa: E402

from repro.experiments.e2_orchestration import run_grid, speedups  # noqa: E402


def main(spark, quick: bool = False) -> list[dict]:
    kwargs = dict(n_steps=2 if quick else 4)
    if quick:
        kwargs.update(
            backbones=("llama-12b",),
            encoders=("vit-2b",),
            datasets=("coyo700m",),
        )
    cells = run_grid(spark, **kwargs)
    table = [
        {
            "dataset": c.dataset,
            "backbone": c.backbone,
            "encoder": c.encoder,
            "ctx": c.context_length,
            "strategy": c.strategy,
            "tokens_per_s": c.throughput,
        }
        for c in cells
    ]
    print_table(table, "E2 — orchestration throughput (Fig. 13)")

    sp = speedups(cells)
    print_table(
        [
            {k: r[k] for k in ("dataset", "backbone", "encoder", "context_length", "strategy", "speedup")}
            for r in sp
        ],
        "E2 — speedups over Vanilla",
    )
    hybrid = [r for r in sp if r["strategy"] == "hybrid"]
    by_ctx = {}
    for r in hybrid:
        by_ctx.setdefault(r["context_length"], []).append(r["speedup"])
    summary = [
        {"context_length": k, "avg_hybrid_speedup": float(np.mean(v)), "max": float(np.max(v))}
        for k, v in sorted(by_ctx.items())
    ]
    print_table(
        summary,
        "E2 — avg hybrid speedup by context (paper: 1.71x @4k, 2.63x @8k, 3.09x @16k; up to 4.54x)",
    )
    return table


if __name__ == "__main__":
    main(get_session("e2-orchestration"), quick="--quick" in sys.argv)
