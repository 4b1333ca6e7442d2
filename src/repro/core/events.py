"""Temporal events, event instances, and temporal relations (Section III-C).

A temporal event is a ``series:symbol`` pair (e.g. ``C:1``); an event
*instance* is one maximal run of that symbol inside a coarse granule,
with inclusive fine-granule endpoints ``[start, end]``.

Relations follow the paper's Table III (Allen-style Follows / Contains /
Overlaps with a tolerance buffer ``epsilon`` and minimal overlap ``d_o``).
Intervals are inclusive integer granule spans, so two instances *touch*
when ``b.start == a.end`` (they share a granule) and ``b`` strictly
follows ``a`` when ``b.start >= a.end + 1``.

Determinism notes (documented in DESIGN.md):

* Instances are put in *canonical order* ``(start, -end, series, symbol)``
  before classification, so at equal starts the longer interval is the
  potential container, and exact ties break lexicographically — this
  reproduces the paper's running example (e.g. ``C:1 contains D:1`` at
  H_2 of Table IV where both instances are ``[G_4, G_4]``).
* With ``epsilon > 0`` the three conditions are no longer mutually
  exclusive at the boundaries; we resolve Contains > Follows > Overlaps,
  matching the case analysis of the paper's Property 1 proof.
"""
from __future__ import annotations

from dataclasses import dataclass

FOLLOWS = "->"
CONTAINS = ">="
OVERLAPS = "~"
RELATIONS = (FOLLOWS, CONTAINS, OVERLAPS)


@dataclass(frozen=True, order=True)
class EventInstance:
    """One occurrence ``(series:symbol, [start, end])`` of a temporal event."""

    start: int
    end: int
    series: str
    symbol: str

    def __post_init__(self) -> None:
        if self.end < self.start:
            raise ValueError(f"end {self.end} < start {self.start}")

    @property
    def event(self) -> str:
        """The event key ``series:symbol`` this instance belongs to."""
        return f"{self.series}:{self.symbol}"

    @property
    def duration(self) -> int:
        return self.end - self.start + 1


def event_key(series: str, symbol: str) -> str:
    return f"{series}:{symbol}"


def canonical_sort_key(inst: EventInstance) -> tuple:
    """Sort key placing potential containers first: start asc, end desc, name."""
    return (inst.start, -inst.end, inst.series, inst.symbol)


def classify(a: EventInstance, b: EventInstance, *, epsilon: int = 0, d_o: int = 1) -> str | None:
    """Relation of ``a`` (canonically first) to ``b``, or None.

    Preconditions: ``canonical_sort_key(a) <= canonical_sort_key(b)``.

    Conditions (inclusive intervals, Table III with buffer epsilon):

    * Contains: ``a.start <= b.start`` and ``b.end <= a.end + epsilon``
    * Follows:  ``b.start >= a.end + 1 - epsilon``
    * Overlaps: ``a.start < b.start`` and ``a.end < b.end`` and
      ``overlap_len = a.end - b.start + 1 >= d_o - epsilon``
    """
    if a.start <= b.start and b.end <= a.end + epsilon:
        return CONTAINS
    if b.start >= a.end + 1 - epsilon:
        return FOLLOWS
    if a.start < b.start and a.end < b.end and (a.end - b.start + 1) >= d_o - epsilon:
        return OVERLAPS
    return None


def pair_relation(
    x: EventInstance, y: EventInstance, *, epsilon: int = 0, d_o: int = 1
) -> tuple[str, EventInstance, EventInstance] | None:
    """Order two instances canonically and classify; ``(rel, first, second)``."""
    a, b = sorted((x, y), key=canonical_sort_key)
    rel = classify(a, b, epsilon=epsilon, d_o=d_o)
    if rel is None:
        return None
    return rel, a, b


def render_triple(rel: str, first: str, second: str) -> str:
    """Human-readable triple, e.g. ``C:1 >= D:1``."""
    return f"{first} {rel} {second}"
