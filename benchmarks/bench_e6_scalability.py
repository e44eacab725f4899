"""E6 benchmark (Fig. 18): actor-model scalability sweep."""
from repro.experiments.e6_scalability import run


def test_e6_scalability(benchmark):
    pts = benchmark(run)
    by = {p.n_gpus: p for p in pts}
    assert by[2048].slowdown >= 5.0
    assert by[4096].direct_collapsed
