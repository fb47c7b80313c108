"""Unit tests for the interval / run-scan primitives in core.ranges."""
import numpy as np
import pandas as pd
import pytest

from repro.core import ranges as rg


def interval_df(pairs, col="x"):
    return pd.DataFrame(
        {rg.lo(col): [p[0] for p in pairs], rg.hi(col): [p[1] for p in pairs]}
    )


class TestNaming:
    def test_lo_hi_delta(self):
        assert rg.lo("a0") == "a0_lo"
        assert rg.hi("b1") == "b1_hi"
        assert rg.delta("a0", "b1") == "a0__b1"


class TestPairChanged:
    def test_detects_value_changes(self):
        df = interval_df([(1, 2), (1, 2), (1, 3), (4, 4)])
        got = rg.pair_changed(df, "x")
        assert got.tolist() == [True, False, True, True]

    def test_nan_equals_nan(self):
        df = interval_df([(np.nan, np.nan), (np.nan, np.nan), (1, 1)])
        got = rg.pair_changed(df, "x")
        assert got.tolist() == [True, False, True]

    def test_nan_vs_value_is_change(self):
        df = interval_df([(1, 1), (np.nan, np.nan), (1, 1)])
        assert rg.pair_changed(df, "x").tolist() == [True, True, True]


class TestNextTrue:
    def test_basic(self):
        mask = np.array([False, True, False, False, True, False])
        got = rg.next_true_at_or_after(mask)
        assert got.tolist() == [1, 1, 4, 4, 4, 6]

    def test_all_false(self):
        assert rg.next_true_at_or_after(np.zeros(3, dtype=bool)).tolist() == [3, 3, 3]


class TestExplodeInterval:
    def test_expands_and_drops_pair(self):
        df = interval_df([(0, 2), (5, 5)])
        out = rg.explode_interval(df, "x", "v")
        assert out["v"].tolist() == [0, 1, 2, 5]
        assert "x_lo" not in out.columns

    def test_empty(self):
        df = interval_df([])
        out = rg.explode_interval(df, "x", "v")
        assert len(out) == 0 and "v" in out.columns

    def test_inverted_raises(self):
        with pytest.raises(ValueError):
            rg.explode_interval(interval_df([(3, 1)]), "x", "v")


class TestUnionSweep:
    def test_merges_overlap_and_adjacent(self):
        df = interval_df([(0, 2), (3, 5), (5, 7), (10, 11)])
        out = rg.union_sweep(df, "x", [])
        got = sorted(zip(out[rg.lo("x")], out[rg.hi("x")]))
        assert got == [(0.0, 7.0), (10.0, 11.0)]

    def test_contained_interval_absorbed(self):
        df = interval_df([(0, 10), (2, 3)])
        out = rg.union_sweep(df, "x", [])
        assert len(out) == 1
        assert (out.iloc[0][rg.lo("x")], out.iloc[0][rg.hi("x")]) == (0, 10)

    def test_respects_groups(self):
        df = interval_df([(0, 1), (2, 3), (0, 1)], col="x")
        df[rg.lo("g")] = [0.0, 0.0, 1.0]
        df[rg.hi("g")] = [0.0, 0.0, 1.0]
        out = rg.union_sweep(df, "x", ["g"])
        assert len(out) == 2  # group 0 merges [0,3]; group 1 stays


class TestGroupChanged:
    def test_multi_column(self):
        df = interval_df([(1, 1), (1, 1), (1, 1)], col="x")
        df[rg.lo("y")] = [0.0, 0.0, 5.0]
        df[rg.hi("y")] = [0.0, 0.0, 5.0]
        got = rg.group_changed(df, ["x", "y"])
        assert got.tolist() == [True, False, True]
