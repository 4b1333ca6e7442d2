"""A-STPM: approximate STPM via mutual-information pruning (Algorithm 2).

Given the symbolic database (fine-granularity symbol arrays per series),
A-STPM computes the NMI of every series pair, derives the mu threshold
from Corollary 1.1 (minimum over the pair's event pairs), and keeps only
*correlated* pairs — ``min(NMI(X;Y), NMI(Y;X)) >= mu`` (Def. 5.4).
Single events and 2-event patterns are then mined only from correlated
series / pairs; k >= 3 mining is the exact algorithm on top of the
restricted HLH_2 (so the approximation cascades, as in the paper).
"""
from __future__ import annotations

from dataclasses import dataclass, field
from itertools import combinations
from typing import Mapping, Sequence

from .estpm import MiningResult, mine
from .mi import mu_series_pair, pair_min_nmis, probabilities
from .seasonal import STPMParams
from .sequences import DSeq


@dataclass
class CorrelationReport:
    """Outcome of the MI screening step (drives Table XI of the paper)."""

    n_series: int
    kept_series: set[str] = field(default_factory=set)
    pruned_series: set[str] = field(default_factory=set)
    correlated_pairs: set[frozenset[str]] = field(default_factory=set)
    #: per-pair diagnostics: (min NMI, mu threshold)
    pair_scores: dict[frozenset[str], tuple[float, float]] = field(default_factory=dict)

    @property
    def pct_series_pruned(self) -> float:
        return 100.0 * len(self.pruned_series) / max(1, self.n_series)


def screen_correlated(
    symbolic: Mapping[str, Sequence[str]],
    params: STPMParams,
    n_seq: int,
    *,
    pair_nmis: Mapping[frozenset, float] | None = None,
) -> CorrelationReport:
    """MI screening (Alg. 2 lines 1-5) over the symbolic database.

    ``pair_nmis`` (from :func:`repro.core.mi.pair_min_nmis`) lets callers
    reuse the NMI matrix across threshold configurations — the paper
    notes MI is computed once per dataset while mu varies per setting.
    """
    names = sorted(symbolic)
    probs = {s: probabilities(symbolic[s]) for s in names}
    rep = CorrelationReport(n_series=len(names))
    if pair_nmis is None:
        pair_nmis = pair_min_nmis(symbolic)
    for xa, xb in combinations(names, 2):
        min_nmi = pair_nmis[frozenset((xa, xb))]
        mu = mu_series_pair(
            probs[xa],
            probs[xb],
            min_season=params.min_season,
            min_density=params.min_density,
            n_seq=n_seq,
        )
        key = frozenset((xa, xb))
        rep.pair_scores[key] = (min_nmi, mu)
        if min_nmi >= mu:
            rep.correlated_pairs.add(key)
            rep.kept_series.update((xa, xb))
    rep.pruned_series = set(names) - rep.kept_series
    return rep


@dataclass
class ApproxResult:
    """A-STPM output: the mining result plus the screening report."""

    mining: MiningResult
    screening: CorrelationReport
    pct_events_pruned: float


def mine_approx(
    symbolic: Mapping[str, Sequence[str]],
    dseq: DSeq,
    params: STPMParams,
    *,
    apriori: bool = True,
    transitivity: bool = True,
    pair_nmis: Mapping[frozenset, float] | None = None,
) -> ApproxResult:
    """Run A-STPM: MI screening, then restricted E-STPM (Alg. 2 lines 6-10)."""
    rep = screen_correlated(symbolic, params, dseq.n_granules, pair_nmis=pair_nmis)
    mining = mine(
        dseq,
        params,
        apriori=apriori,
        transitivity=transitivity,
        allowed_pairs=rep.correlated_pairs,
        restrict_series=rep.kept_series,
    )
    # events pruned = candidate events whose series was screened out. The
    # denominator uses a lenient seasonal gate (minSeason floored at 4):
    # it measures how much of the *potential* single-event search space
    # the MI screen removes, independent of how strict this particular
    # configuration's own maxSeason gate already is (the paper's Table XI
    # does not pin down the denominator; DESIGN.md documents this choice).
    from .estpm import build_event_supports
    from .seasonal import is_candidate

    lenient = params.with_(min_season=min(params.min_season, 4))
    full = build_event_supports(dseq)
    all_candidates = {
        ev for ev, e in full.events.items() if is_candidate(len(e.sup), lenient)
    }
    pruned = {
        ev for ev in all_candidates if ev.split(":", 1)[0] in rep.pruned_series
    }
    pct_events = 100.0 * len(pruned) / max(1, len(all_candidates))
    return ApproxResult(mining=mining, screening=rep, pct_events_pruned=pct_events)


def accuracy(approx: MiningResult, exact: MiningResult) -> float:
    """A-STPM accuracy: % of exact frequent seasonal patterns recovered.

    Defined over k >= 2 patterns (the paper compares "patterns extracted
    by A-STPM and E-STPM"); 100.0 when the exact set is empty, since
    nothing was missed.
    """
    exact_set = set(exact.patterns)
    if not exact_set:
        return 100.0
    return 100.0 * len(exact_set & set(approx.patterns)) / len(exact_set)
