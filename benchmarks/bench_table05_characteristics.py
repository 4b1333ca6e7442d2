"""Bench for Table V: dataset characteristics harness."""
from repro.experiments.tables import table05_characteristics


def test_table05(benchmark):
    df = benchmark(table05_characteristics)
    assert len(df) == 4
