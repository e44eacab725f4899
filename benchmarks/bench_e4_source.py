"""E4 benchmark (Fig. 15): source-partitioning memory sweep over worker
counts and SP degrees for both dataset groups."""
from repro.experiments.e4_source import run_grid


def test_e4_source_partitioning(benchmark):
    rows = benchmark.pedantic(run_grid, rounds=3, iterations=1)
    by = {(r.dataset, r.workers, r.sp): r.total_mem_gb for r in rows}
    assert by[("navit_data", 4, 2)] < by[("navit_data", 4, 1)]
    assert by[("navit_data", 4, 1)] > by[("navit-100", 4, 1)]
