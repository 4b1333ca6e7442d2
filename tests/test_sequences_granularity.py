"""Sequence mapping, RLE instance extraction, granularity arithmetic."""
import pytest
from hypothesis import given, strategies as st

from repro.core.granularity import (
    GranularityHierarchy,
    coarse_granule,
    fine_span,
    pct_to_count,
    period,
)
from repro.core.sequences import (
    build_dseq,
    build_dseq_from_instances,
    rle_instances,
)
from repro.core.events import EventInstance


class TestGranularity:
    def test_coarse_granule(self):
        assert coarse_granule(0, 3) == 0
        assert coarse_granule(2, 3) == 0
        assert coarse_granule(3, 3) == 1

    def test_fine_span(self):
        assert fine_span(0, 3) == (0, 2)
        assert fine_span(2, 3) == (6, 8)

    def test_period(self):
        assert period(1, 6) == 5  # Minute_1 .. Minute_6 example

    def test_pct_to_count(self):
        # paper Table VI: maxPeriod 0.2% of a 1460-granule D_SEQ -> 3
        assert pct_to_count(0.2, 1460) == 3
        assert pct_to_count(0.5, 1460) == 7
        assert pct_to_count(0.0001, 100) == 1  # floor at 1

    def test_hierarchy(self):
        h = GranularityHierarchy(("5min", "15min", "1h"), (3, 4))
        assert h.m_between("5min", "15min") == 3
        assert h.m_between("5min", "1h") == 12
        assert h.m_between("15min", "15min") == 1
        with pytest.raises(ValueError):
            h.m_between("1h", "5min")

    def test_hierarchy_validation(self):
        with pytest.raises(ValueError):
            GranularityHierarchy(("a", "b"), ())
        with pytest.raises(ValueError):
            GranularityHierarchy(("a", "b"), (0,))


class TestRLE:
    def test_simple(self):
        out = rle_instances("C", list("1100"))
        assert [(i.symbol, i.start, i.end) for i in out] == [("1", 0, 1), ("0", 2, 3)]

    def test_offset(self):
        out = rle_instances("C", list("01"), t0=10)
        assert [(i.start, i.end) for i in out] == [(10, 10), (11, 11)]

    def test_none_breaks_runs(self):
        out = rle_instances("C", ["1", None, "1"])
        assert [(i.start, i.end) for i in out] == [(0, 0), (2, 2)]

    @given(st.lists(st.sampled_from("ab"), min_size=1, max_size=30))
    def test_roundtrip_covers_everything(self, syms):
        out = rle_instances("S", syms)
        covered = [None] * len(syms)
        for i in out:
            for t in range(i.start, i.end + 1):
                assert covered[t] is None
                covered[t] = i.symbol
        assert covered == syms


class TestBuildDseq:
    def test_partial_trailing_block(self):
        d = build_dseq({"A": list("11111")}, m=3)
        assert d.n_granules == 2
        assert [(i.start, i.end) for i in d.instances(1)] == [(3, 4)]

    def test_multi_series_canonical_order(self):
        d = build_dseq({"B": list("111"), "A": list("011")}, m=3)
        row = d.instances(0)
        # canonical: start asc, end desc, name asc -> B:[0,2] first
        assert [i.series for i in row] == ["B", "A", "A"]

    def test_event_and_series_names(self):
        d = build_dseq({"A": list("01"), "B": list("11")}, m=2)
        assert d.event_names() == ["A:0", "A:1", "B:1"]
        assert d.series_names() == ["A", "B"]
        assert d.n_instances() == 3

    def test_rejects_bad_m(self):
        with pytest.raises(ValueError):
            build_dseq({"A": list("1")}, m=0)

    def test_from_instances_matches_build(self):
        sym = {"A": list("110010"), "B": list("001110")}
        d1 = build_dseq(sym, m=3)
        insts = [i for h in range(d1.n_granules) for i in d1.instances(h)]
        d2 = build_dseq_from_instances(insts, m=3, n_granules=2)
        assert d1.rows == d2.rows

    def test_from_instances_rejects_spanning(self):
        with pytest.raises(ValueError):
            build_dseq_from_instances(
                [EventInstance(2, 3, "A", "1")], m=3, n_granules=2
            )
