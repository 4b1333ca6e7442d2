"""Bench for Table IX: one RE pattern-count cell (full E-STPM run)."""
from repro.core.estpm import mine


def test_table09_cell(benchmark, re_data, re_params):
    _, _, dseq = re_data
    res = benchmark(mine, dseq, re_params)
    assert res.stats["n_frequent_patterns"] > 0
