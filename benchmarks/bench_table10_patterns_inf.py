"""Bench for Table X: one INF pattern-count cell (full E-STPM run)."""
from repro.core.estpm import mine


def test_table10_cell(benchmark, inf_data, inf_params):
    _, _, dseq = inf_data
    res = benchmark(mine, dseq, inf_params)
    assert res.stats["n_frequent_patterns"] > 0
