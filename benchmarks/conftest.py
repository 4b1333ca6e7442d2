"""Shared benchmark fixtures: datasets and params built once per session."""
import pytest

from repro.core.seasonal import STPMParams
from repro.core.sequences import build_dseq
from repro.datasets import gen_symbols, profile
from repro.experiments.tables import IGNORE_BACKGROUND, params_for


@pytest.fixture(scope="session")
def inf_data():
    p = profile("inf")
    symbols = gen_symbols(p)
    dseq = build_dseq(symbols, p.m, ignore_symbols=IGNORE_BACKGROUND)
    return p, symbols, dseq


@pytest.fixture(scope="session")
def re_data():
    p = profile("re")
    symbols = gen_symbols(p)
    dseq = build_dseq(symbols, p.m, ignore_symbols=IGNORE_BACKGROUND)
    return p, symbols, dseq


@pytest.fixture(scope="session")
def inf_params(inf_data) -> STPMParams:
    p, _, _ = inf_data
    return params_for(p, max_period_pct=0.4, min_density_pct=0.75, min_season=8)


@pytest.fixture(scope="session")
def re_params(re_data) -> STPMParams:
    p, _, _ = re_data
    return params_for(p, max_period_pct=0.4, min_density_pct=0.75, min_season=8)
