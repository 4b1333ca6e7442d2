"""The paper's running example: Table II symbolic database.

5 appliance series (C: Cooker, D: Dish washer, F: Food processor,
M: Microwave, N: Nespresso) at 5-Minutes granularity, 42 granules,
mapped 3-Finer into the 15-Minutes D_SEQ of Table IV. The expected
values asserted in tests are taken from the paper's Sections III-IV.
"""
from repro.core.seasonal import STPMParams
from repro.core.sequences import DSeq, build_dseq

TABLE_II = {
    "C": "110100110000000000111111000000100110000110",
    "D": "100100110110000000111111000000100100110110",
    "F": "001011001001111000000000111111001001001001",
    "M": "111100111110111111000111111111111000111000",
    "N": "110111111110111111000000111111111111111000",
}

#: Table VI-style thresholds used throughout Section IV's walk-through.
EXAMPLE_PARAMS = STPMParams(
    max_period=2, min_density=3, dist_min=4, dist_max=10, min_season=2, max_k=3
)


def example_symbolic() -> dict[str, list[str]]:
    return {k: list(v) for k, v in TABLE_II.items()}


def example_dseq() -> DSeq:
    return build_dseq(example_symbolic(), m=3)
