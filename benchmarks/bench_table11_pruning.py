"""Bench for Table XI: MI screening sweep at one scale point."""
from repro.experiments.tables import pruning_table


def test_table11_n30(benchmark):
    df = benchmark(pruning_table, "inf", n_series_sweep=(30,))
    assert (df["series_12-0.5"] > 0).all()
