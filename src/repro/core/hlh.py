"""Hierarchical lookup hash structures HLH_1 and HLH_k (Figs. 4-5).

``HLH1`` plays the role of the paper's EH + GH pair: per candidate
single event it keeps the support set (the EH value / GH key) and the
representative instance per granule (the GH value).

``HLHk`` plays the role of EH_k + PH_k + GH_k: per candidate k-event
group it keeps the group support set (EH_k), and per candidate pattern
of that group the pattern's support set (PH_k) plus the granule ->
pattern index (GH_k's role of tying granules to the instances/relations
that formed the pattern; instances themselves are recoverable from
HLH1's per-granule representatives, so we store positions only).

A *pattern* is a tuple of rendered triples ``(rel, first_event,
second_event)`` covering every pair of the group, ordered by the
canonical instance order in the granule where it occurs.
"""
from __future__ import annotations

from dataclasses import dataclass, field

from .events import EventInstance

Pattern = tuple[tuple[str, str, str], ...]  # ((rel, ev_i, ev_j), ...)


@dataclass
class EventEntry:
    """HLH_1 row: one candidate seasonal single event."""

    event: str
    sup: set[int] = field(default_factory=set)
    #: representative (canonically first) instance per granule
    instance: dict[int, EventInstance] = field(default_factory=dict)


@dataclass
class HLH1:
    events: dict[str, EventEntry] = field(default_factory=dict)

    def add(self, h: int, inst: EventInstance) -> None:
        e = self.events.setdefault(inst.event, EventEntry(inst.event))
        e.sup.add(h)
        # canonical order within a granule is already sorted upstream, so
        # the first add per (event, granule) is the representative
        e.instance.setdefault(h, inst)

    def __contains__(self, event: str) -> bool:
        return event in self.events

    def __len__(self) -> int:
        return len(self.events)


@dataclass
class GroupEntry:
    """HLH_k row: one candidate seasonal k-event group and its patterns."""

    events: tuple[str, ...]  # sorted event keys
    sup: set[int] = field(default_factory=set)
    #: candidate pattern -> support set (PH_k)
    patterns: dict[Pattern, set[int]] = field(default_factory=dict)
    #: granule -> pattern formed there (GH_k); at most one per granule
    #: because relations are computed from representative instances
    pattern_at: dict[int, Pattern] = field(default_factory=dict)


@dataclass
class HLHk:
    k: int
    groups: dict[tuple[str, ...], GroupEntry] = field(default_factory=dict)

    def events_in_patterns(self) -> set[str]:
        """Single events appearing in at least one candidate pattern.

        This is the transitivity filter's source set (Lemma 4 /
        ``Transitivity_Filtering`` in Alg. 1): an event absent from every
        candidate (k-1)-event pattern cannot extend any of them.
        """
        out: set[str] = set()
        for g in self.groups.values():
            if g.patterns:
                out.update(g.events)
        return out

    def __len__(self) -> int:
        return len(self.groups)
