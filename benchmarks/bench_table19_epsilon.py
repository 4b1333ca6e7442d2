"""Bench for Tables XIX/XX: epsilon sensitivity on one dataset."""
from repro.experiments.tables import epsilon_table


def test_table19_inf(benchmark):
    df = benchmark(epsilon_table, datasets=("inf",), eps_values=(0, 1))
    assert len(df) == 2
