"""Bench for Table VIII: qualitative patterns on the INF stand-in."""
from repro.experiments.qualitative import table08_qualitative


def test_table08_inf(benchmark):
    df = benchmark(table08_qualitative, datasets=("inf",))
    assert df["found"].all()
