"""Bench for Table XII: synthetic accuracy at one scale point."""
from repro.experiments.tables import accuracy_synthetic_table


def test_table12_n30(benchmark):
    df = benchmark(
        accuracy_synthetic_table, "inf", n_series_sweep=(30,), combos=((12, 0.5),)
    )
    assert df.iloc[0]["12-0.5"] > 0
