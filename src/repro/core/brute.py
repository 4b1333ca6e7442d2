"""Brute-force reference miner — the correctness oracle for E-STPM.

Enumerates every event subset up to ``max_k`` with *no* data structures
and *no* pruning: for each subset and each granule it computes all
pairwise relations from the representative instances and, if all are
defined, records a pattern occurrence. Frequent seasonal patterns then
come from the plain Def. 3.17 check.

Exponential on purpose — only ever run on tiny inputs in tests, where
its output must equal :func:`repro.core.estpm.mine` under every pruning
configuration (that equality is what makes the pruning *safe*, per
Lemmas 1-4).
"""
from __future__ import annotations

from itertools import combinations

from .events import pair_relation
from .hlh import Pattern
from .seasonal import STPMParams, SeasonalVerdict, evaluate_seasonality
from .sequences import DSeq


def mine_brute(dseq: DSeq, params: STPMParams) -> tuple[dict[str, SeasonalVerdict], dict[Pattern, SeasonalVerdict]]:
    """Return (frequent seasonal singles, frequent seasonal k>=2 patterns)."""
    # representative instance per (event, granule)
    rep: dict[str, dict[int, object]] = {}
    for h, insts in dseq.rows.items():
        for inst in insts:
            rep.setdefault(inst.event, {}).setdefault(h, inst)

    singles: dict[str, SeasonalVerdict] = {}
    for ev, occ in rep.items():
        verdict = evaluate_seasonality(occ.keys(), params)
        if verdict.frequent:
            singles[ev] = verdict

    patterns: dict[Pattern, set[int]] = {}
    events = sorted(rep)
    for k in range(2, params.max_k + 1):
        for group in combinations(events, k):
            shared = set.intersection(*(set(rep[e]) for e in group))
            for h in shared:
                triples = []
                for ea, eb in combinations(group, 2):
                    r = pair_relation(
                        rep[ea][h], rep[eb][h], epsilon=params.epsilon, d_o=params.d_o
                    )
                    if r is None:
                        triples = None
                        break
                    rel, first, second = r
                    triples.append((rel, first.event, second.event))
                if triples is None:
                    continue
                patterns.setdefault(tuple(sorted(triples)), set()).add(h)

    frequent: dict[Pattern, SeasonalVerdict] = {}
    for pattern, sup in patterns.items():
        verdict = evaluate_seasonality(sup, params)
        if verdict.frequent:
            frequent[pattern] = verdict
    return singles, frequent
