"""Symbolization (Def. 3.7): threshold, quantile, and SAX-lite mappings."""
import numpy as np
import pytest

from repro.core.symbolize import (
    quantile_symbols,
    sax_symbols,
    threshold_symbols,
)


class TestThreshold:
    def test_paper_on_off_example(self):
        """X = 1.82, 1.25, 0.46, 0.0 with an ON/OFF alphabet -> 1,1,1,0."""
        x = [1.82, 1.25, 0.46, 0.0]
        assert threshold_symbols(x, [0.1], alphabet=["0", "1"]) == ["1", "1", "1", "0"]

    def test_multi_cut(self):
        out = threshold_symbols([0, 5, 10], [2, 8], alphabet=list("LMH"))
        assert out == ["L", "M", "H"]

    def test_boundary_goes_up(self):
        assert threshold_symbols([2.0], [2.0], alphabet=["a", "b"]) == ["b"]

    def test_rejects_unsorted_cuts(self):
        with pytest.raises(ValueError):
            threshold_symbols([1], [3, 2])

    def test_rejects_wrong_label_count(self):
        with pytest.raises(ValueError):
            threshold_symbols([1], [0.5], alphabet=["only-one"])


class TestQuantile:
    def test_balanced_bins(self):
        rng = np.random.default_rng(0)
        vals = rng.normal(size=3000)
        out = quantile_symbols(vals, 3)
        counts = {s: out.count(s) for s in set(out)}
        assert len(counts) == 3
        assert all(abs(c - 1000) < 100 for c in counts.values())

    def test_constant_series_single_bin(self):
        out = quantile_symbols([5.0] * 10, 4)
        assert len(set(out)) == 1

    def test_default_alphabet(self):
        out = quantile_symbols([1, 2, 3, 4], 2)
        assert set(out) <= {"0", "1"}


class TestSax:
    def test_breakpoints_balanced_on_gaussian(self):
        rng = np.random.default_rng(1)
        out = sax_symbols(rng.normal(size=5000), 4)
        counts = {s: out.count(s) for s in set(out)}
        assert len(counts) == 4
        assert all(abs(c - 1250) < 150 for c in counts.values())

    def test_constant_series(self):
        out = sax_symbols([3.0] * 8, 3)
        assert len(set(out)) == 1

    def test_unsupported_size(self):
        with pytest.raises(ValueError):
            sax_symbols([1.0, 2.0], 9)

    def test_custom_alphabet(self):
        out = sax_symbols([0.0, 100.0] * 20, 2, alphabet=["lo", "hi"])
        assert set(out) == {"lo", "hi"}
