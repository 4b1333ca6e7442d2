"""Figs. 15-16 shape: E-STPM pruning variants on the same input."""
import pytest

from repro.core.estpm import mine


@pytest.mark.parametrize(
    "apriori,transitivity",
    [(False, False), (True, False), (False, True), (True, True)],
    ids=["NoPrune", "Apriori", "Trans", "All"],
)
def test_pruning_variant(benchmark, inf_data, inf_params, apriori, transitivity):
    _, _, dseq = inf_data
    res = benchmark(mine, dseq, inf_params, apriori=apriori, transitivity=transitivity)
    assert res.stats["n_frequent_patterns"] > 0
