"""Bench for Table VII: one accuracy grid row on INF."""
from repro.experiments.tables import accuracy_table


def test_table07_inf_row(benchmark):
    df = benchmark(
        accuracy_table, "inf", min_seasons=(12,), min_densities=(0.75,)
    )
    assert df.iloc[0]["md0.75"] >= 0
