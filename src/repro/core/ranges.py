"""Vectorized interval and run-scan primitives.

All compressed columns are closed integer intervals ``[lo, hi]`` stored as
two float64 columns (NaN = absent). float64 represents integers exactly up
to 2**53, far beyond any array index handled here; the Spark boundary casts
back to longs.
"""
from __future__ import annotations

import numpy as np
import pandas as pd


def lo(col: str) -> str:
    """Name of the lower-bound column for logical attribute ``col``."""
    return f"{col}_lo"


def hi(col: str) -> str:
    """Name of the upper-bound column for logical attribute ``col``."""
    return f"{col}_hi"


def delta(val: str, key: str) -> str:
    """Name of the relative (delta) attribute ``val - key``.

    The paper's prose writes the delta as ``b - a`` but its worked tables
    and ``rel_back`` formula require ``a - b`` (see DESIGN.md); here the
    convention is uniformly ``value - key`` so ``value = key + delta``.
    """
    return f"{val}__{key}"


def pair_changed(df: pd.DataFrame, col: str) -> np.ndarray:
    """Boolean mask: row t's ``[lo, hi]`` for ``col`` differs from row t-1's.

    NaN-aware: two NaNs compare equal (same "absent" state); NaN vs value
    is a change. Row 0 is always marked changed.
    """
    out = np.zeros(len(df), dtype=bool)
    for c in (lo(col), hi(col)):
        v = df[c].to_numpy()
        prev = np.roll(v, 1)
        neq = (v != prev) & ~(np.isnan(v) & np.isnan(prev))
        out |= neq
    out[0] = True
    return out


def group_changed(df: pd.DataFrame, cols: list[str]) -> np.ndarray:
    """Boolean mask: any of the interval attributes in ``cols`` changed."""
    out = np.zeros(len(df), dtype=bool)
    out[0] = True
    for c in cols:
        out |= pair_changed(df, c)
    return out


def next_true_at_or_after(mask: np.ndarray) -> np.ndarray:
    """For each index t, the smallest u >= t with ``mask[u]`` (n if none).

    Computed with one reversed running-minimum — O(n), no Python loop.
    Used by the jump-based greedy scan in ProvRC step 2 so its cost is
    O(#runs) instead of O(#rows x run length).
    """
    n = len(mask)
    idx = np.where(mask, np.arange(n), n)
    return np.minimum.accumulate(idx[::-1])[::-1]


def explode_interval(df: pd.DataFrame, col: str, out_col: str) -> pd.DataFrame:
    """Expand interval attribute ``col`` into one row per integer value.

    Vectorized via ``np.repeat``; the expanded scalar lands in ``out_col``
    and the lo/hi pair is dropped.
    """
    if df.empty:
        out = df.drop(columns=[lo(col), hi(col)]).copy()
        out[out_col] = pd.Series(dtype="float64")
        return out
    lo_v = df[lo(col)].to_numpy()
    hi_v = df[hi(col)].to_numpy()
    counts = (hi_v - lo_v + 1).astype(np.int64)
    if (counts <= 0).any():
        raise ValueError(f"empty or inverted interval in {col}")
    rep = df.loc[df.index.repeat(counts)].reset_index(drop=True)
    offsets = np.arange(counts.sum()) - np.repeat(
        np.concatenate(([0], np.cumsum(counts)[:-1])), counts
    )
    rep[out_col] = np.repeat(lo_v, counts) + offsets
    return rep.drop(columns=[lo(col), hi(col)])


def union_sweep(df: pd.DataFrame, col: str, group_cols: list[str]) -> pd.DataFrame:
    """Merge overlapping or adjacent intervals of ``col`` per group.

    ``group_cols`` are interval attributes (lo/hi pairs) that must match
    exactly for two rows to merge. Used by the θ-join's row-reduction
    ("merge") optimization, which unions intervals (subsuming the paper's
    adjacent-interval merge) to minimize rows fed to the next join.
    """
    if df.empty:
        return df
    sort_cols = [lo(g) for g in group_cols] + [hi(g) for g in group_cols] + [lo(col), hi(col)]
    df = df.sort_values(sort_cols, kind="mergesort").reset_index(drop=True)
    grp = group_changed(df, group_cols) if group_cols else np.zeros(len(df), dtype=bool)
    if len(grp):
        grp[0] = True
    lo_v = df[lo(col)].to_numpy()
    hi_v = df[hi(col)].to_numpy()
    # Running max of hi within group: an interval starts a new run iff its
    # lo exceeds (running max hi) + 1 or the group changed.
    run_start = np.zeros(len(df), dtype=bool)
    run_max = -np.inf
    for t in range(len(df)):
        if grp[t] or lo_v[t] > run_max + 1:
            run_start[t] = True
            run_max = hi_v[t]
        else:
            run_max = max(run_max, hi_v[t])
    run_id = np.cumsum(run_start)
    agg = {c: "first" for c in df.columns}
    agg[lo(col)] = "first"
    agg[hi(col)] = "max"
    return df.groupby(run_id, sort=False).agg(agg).reset_index(drop=True)
