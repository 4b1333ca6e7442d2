"""Temporal sequence database construction (Defs. 3.11-3.13).

``build_dseq`` applies the sequence mapping ``g: X_S ->_m H`` to every
symbolic time series: each block of ``m`` adjacent fine-granularity
symbols becomes one coarse granule, and consecutive identical symbols
inside a block are grouped into event instances. The result ``DSeq``
maps coarse granule position -> list of :class:`EventInstance`, which is
the per-row layout of the paper's Table IV.
"""
from __future__ import annotations

from dataclasses import dataclass, field
from typing import Iterable, Mapping, Sequence

from .events import EventInstance, canonical_sort_key


@dataclass
class DSeq:
    """A temporal sequence database at one coarse granularity.

    ``rows[h]`` lists the event instances of coarse granule ``h`` in
    canonical order. ``n_granules`` is |D_SEQ| (granules with no instance
    still count toward the size — periods are positional).
    """

    n_granules: int
    rows: dict[int, list[EventInstance]] = field(default_factory=dict)

    def instances(self, h: int) -> list[EventInstance]:
        return self.rows.get(h, [])

    def event_names(self) -> list[str]:
        """Distinct event keys, sorted."""
        return sorted({i.event for row in self.rows.values() for i in row})

    def series_names(self) -> list[str]:
        return sorted({i.series for row in self.rows.values() for i in row})

    def n_instances(self) -> int:
        return sum(len(r) for r in self.rows.values())


def rle_instances(series: str, symbols: Sequence[str], *, t0: int = 0) -> list[EventInstance]:
    """Run-length encode a symbol block into event instances.

    ``t0`` is the absolute fine position of ``symbols[0]``; ``None``
    symbols (missing data) break runs and produce no instance.
    """
    out: list[EventInstance] = []
    run_sym: str | None = None
    run_start = 0
    for i, sym in enumerate(symbols):
        if sym != run_sym:
            if run_sym is not None:
                out.append(EventInstance(t0 + run_start, t0 + i - 1, series, run_sym))
            run_sym, run_start = sym, i
    if run_sym is not None:
        out.append(EventInstance(t0 + run_start, t0 + len(symbols) - 1, series, run_sym))
    return out


def build_dseq(
    symbolic: Mapping[str, Sequence[str]],
    m: int,
    *,
    ignore_symbols: frozenset[str] | set[str] = frozenset(),
) -> DSeq:
    """Build D_SEQ from a symbolic database via the mapping ``g: X_S ->_m H``.

    ``symbolic`` maps series name -> fine-granularity symbol sequence (all
    series must share a time domain; shorter series are treated as ending
    early). Trailing partial blocks (< m symbols) form a final, shorter
    granule, mirroring how a real deployment truncates at "now".

    ``ignore_symbols`` drops instances of uninformative symbols (e.g. the
    "background/off" level) from the database — an experimental-design
    knob used by the scalability datasets; the paper's running example
    keeps all symbols, which is the default.
    """
    if m <= 0:
        raise ValueError(f"m must be >= 1, got {m}")
    n_fine = max((len(s) for s in symbolic.values()), default=0)
    n_granules = (n_fine + m - 1) // m
    rows: dict[int, list[EventInstance]] = {}
    for series in sorted(symbolic):
        syms = symbolic[series]
        for h in range(n_granules):
            block = syms[h * m : (h + 1) * m]
            if not block:
                continue
            insts = [
                i
                for i in rle_instances(series, block, t0=h * m)
                if i.symbol not in ignore_symbols
            ]
            if insts:
                rows.setdefault(h, []).extend(insts)
    for h in rows:
        rows[h].sort(key=canonical_sort_key)
    return DSeq(n_granules=n_granules, rows=rows)


def build_dseq_from_instances(
    instances: Iterable[EventInstance], m: int, n_granules: int
) -> DSeq:
    """Assemble a DSeq from pre-extracted instances (the Spark path).

    Each instance must lie inside a single coarse granule
    (``start // m == end // m``); Phase-1 extraction guarantees this
    because runs are delimited per granule.
    """
    rows: dict[int, list[EventInstance]] = {}
    for inst in instances:
        h = inst.start // m
        if inst.end // m != h:
            raise ValueError(f"instance {inst} spans coarse granules")
        rows.setdefault(h, []).append(inst)
    for h in rows:
        rows[h].sort(key=canonical_sort_key)
    return DSeq(n_granules=n_granules, rows=rows)
