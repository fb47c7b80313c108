"""The ProvRC lineage-compression kernel (paper §IV), in pandas/numpy.

The kernel is generic over attribute *roles* (see ``model``): step 1
range-encodes the value attributes, step 2 applies the relative value
transformation (``delta = value - key``) and range-encodes the key
attributes with the paper's "exists a constant representation" rule.
Running it with key=B/value=A yields the backward table, with key=A/value=B
the forward table (§IV.C), from a single implementation.

Two deliberate refinements over the paper's prose, both documented in
DESIGN.md:

- the delta sign is ``value - key`` (the paper's tables and ``rel_back``
  require it, its prose says the opposite);
- during step-2 passes *all* surviving representations of a value
  attribute are retained, and pruning to a single representation happens
  in ``finalize``. Pruning eagerly (as a literal reading suggests) would
  destroy later merge opportunities — e.g. the paper's own forward table
  (Table III) is only reachable if the ``b-a`` delta survives the first
  output pass even though the absolute value also survived it.

Losslessness: a compressed row denotes the tuple set obtained by expanding
key ranges (Cartesian) and then each value attribute either from its
absolute range (Cartesian) or as ``key + delta`` per expanded key value.
Every merge performed here preserves that expansion exactly;
``decompress`` implements it and the round trip is property-tested.
"""
from __future__ import annotations

import numpy as np
import pandas as pd

from repro.core import ranges as rg
from repro.core.model import LineageSchema


def to_intervals(df: pd.DataFrame, cols: list[str]) -> pd.DataFrame:
    """Scalar integer columns -> degenerate ``[v, v]`` interval columns."""
    out = pd.DataFrame(index=df.index)
    for c in cols:
        v = df[c].astype("float64")
        out[rg.lo(c)] = v
        out[rg.hi(c)] = v
    return out.reset_index(drop=True)


def _encode_value_pass(df: pd.DataFrame, target: str, other_cols: list[str]) -> pd.DataFrame:
    """One multi-attribute range-encoding pass (paper §IV.A step 1).

    Merges maximal runs of consecutive ``target`` values whose *every*
    other attribute matches exactly. Vectorized gaps-and-islands; no
    Python row loop.
    """
    if df.empty:
        return df
    sort_cols = []
    for c in other_cols:
        sort_cols += [rg.lo(c), rg.hi(c)]
    sort_cols.append(rg.lo(target))
    df = df.sort_values(sort_cols, kind="mergesort").reset_index(drop=True)
    grp = rg.group_changed(df, other_cols) if other_cols else np.zeros(len(df), dtype=bool)
    t_lo = df[rg.lo(target)].to_numpy()
    t_hi = df[rg.hi(target)].to_numpy()
    contig = np.zeros(len(df), dtype=bool)
    contig[1:] = t_lo[1:] == t_hi[:-1] + 1
    new_run = grp | ~contig
    new_run[0] = True
    run_id = np.cumsum(new_run)
    agg = {c: "first" for c in df.columns}
    agg[rg.hi(target)] = "last"
    return df.groupby(run_id, sort=False).agg(agg).reset_index(drop=True)


def _candidates(val: str, key_cols: tuple[str, ...]) -> list[str]:
    """Representation candidates for one value attribute (abs + all deltas)."""
    return [val] + [rg.delta(val, k) for k in key_cols]


def _encode_key_pass(
    df: pd.DataFrame,
    target: str,
    other_keys: list[str],
    val_cols: tuple[str, ...],
    key_cols: tuple[str, ...],
) -> pd.DataFrame:
    """One range-encoding pass over a key attribute (paper §IV.A step 2).

    The greedy scan's merges depend on row order, and no single sort
    serves every lineage pattern: a value attribute that is constant
    along a run must sort *before* the target to cluster its rows (e.g.
    cross's a1 in {0, 2}), while a delta-monotone attribute sorts
    harmlessly anywhere. So the pass scans once per rotation of the
    value-column order and keeps, per group of the other key attributes,
    the rotation producing the fewest rows. Every scan is independently
    lossless, and per-group selection makes the result identical whether
    the pass runs globally (pandas kernel) or per bucket (Spark).
    """
    if df.empty:
        return df
    # Candidate sort orderings, because the greedy scan is order-dependent
    # and no single sort serves every pattern:
    # - ((), 'abs'):      target first — delta-run friendly (tile offsets);
    # - (rot, 'abs'):     one value's absolute interval first — clusters
    #                     same-value runs (cross's a1 in {0, 2});
    # - (rot, 'delta'):   one value's delta columns first — clusters
    #                     same-shift runs when a key has several deltas
    #                     (gradient's i-1 / i+1 windows).
    orderings: list[tuple[tuple[str, ...], str]] = [((), "abs")]
    for i in range(len(val_cols)):
        rot = tuple(val_cols[i:] + val_cols[:i])
        orderings.append((rot, "abs"))
        orderings.append((rot, "delta"))
    grp_cols = [c for k in other_keys for c in (rg.lo(k), rg.hi(k))]
    best: pd.DataFrame | None = None
    for order, mode in orderings:
        out = _scan_key_pass(df, target, other_keys, order, val_cols, key_cols, mode)
        if best is None:
            best = out
            continue
        if not grp_cols:
            if len(out) < len(best):
                best = out
            continue
        counts_new = out.groupby(grp_cols, dropna=False, sort=False).size()
        counts_old = best.groupby(grp_cols, dropna=False, sort=False).size()
        better = counts_new[counts_new < counts_old.reindex(counts_new.index)].index
        if len(better):
            better_set = set(better if isinstance(better, pd.MultiIndex) else [(b,) for b in better])
            key_new = out[grp_cols].apply(tuple, axis=1)
            key_old = best[grp_cols].apply(tuple, axis=1)
            best = pd.concat(
                [best[~key_old.isin(better_set)], out[key_new.isin(better_set)]],
                ignore_index=True,
            )
    return best.reset_index(drop=True)


def _scan_key_pass(
    df: pd.DataFrame,
    target: str,
    other_keys: list[str],
    sort_val_order: tuple[str, ...],
    val_cols: tuple[str, ...],
    key_cols: tuple[str, ...],
    sort_mode: str = "abs",
) -> pd.DataFrame:
    """One greedy scan with a fixed sort order (see ``_encode_key_pass``).

    Jumps between precomputed next-change indices, so cost is O(#runs).
    """
    cand_cols = [c for v in val_cols for c in _candidates(v, key_cols)]
    sort_cols = []
    for c in other_keys:
        sort_cols += [rg.lo(c), rg.hi(c)]
    for v in sort_val_order:
        if sort_mode == "delta":
            for k in key_cols:
                d = rg.delta(v, k)
                sort_cols += [rg.lo(d), rg.hi(d)]
        else:
            sort_cols += [rg.lo(v), rg.hi(v)]
    sort_cols.append(rg.lo(target))
    for c in cand_cols:
        if rg.lo(c) not in sort_cols:
            sort_cols += [rg.lo(c), rg.hi(c)]
    df = df.sort_values(sort_cols, kind="mergesort").reset_index(drop=True)
    n = len(df)

    t_lo = df[rg.lo(target)].to_numpy()
    t_hi = df[rg.hi(target)].to_numpy()
    grp = rg.group_changed(df, other_keys) if other_keys else np.zeros(n, dtype=bool)
    contig = np.zeros(n, dtype=bool)
    contig[1:] = t_lo[1:] == t_hi[:-1] + 1
    hard = grp | ~contig
    hard[0] = True
    next_hard = rg.next_true_at_or_after(hard)

    next_brk = {c: rg.next_true_at_or_after(rg.pair_changed(df, c)) for c in cand_cols}
    notnull = {c: ~np.isnan(df[rg.lo(c)].to_numpy()) for c in cand_cols}

    starts: list[int] = []
    ends: list[int] = []
    s = 0
    while s < n:
        e = next_hard[s + 1] - 1 if s + 1 < n else n - 1
        for v in val_cols:
            ext_v = s
            for c in _candidates(v, key_cols):
                if notnull[c][s]:
                    ext_c = (next_brk[c][s + 1] - 1) if s + 1 < n else n - 1
                    ext_v = max(ext_v, ext_c)
            e = min(e, ext_v)
        starts.append(s)
        ends.append(e)
        s = e + 1

    s_arr = np.asarray(starts)
    e_arr = np.asarray(ends)
    out = df.iloc[s_arr].reset_index(drop=True)
    out[rg.hi(target)] = t_hi[e_arr]
    # Null out candidate representations that did not survive their run.
    for c in cand_cols:
        survived = notnull[c][s_arr] & (
            np.where(s_arr + 1 < n, next_brk[c][np.minimum(s_arr + 1, n - 1)], n) > e_arr
        )
        dead = ~survived
        if dead.any():
            out.loc[dead, [rg.lo(c), rg.hi(c)]] = np.nan
    return out


def compress(df: pd.DataFrame, schema: LineageSchema, *, prune: bool = True) -> pd.DataFrame:
    """Run the full ProvRC algorithm on an uncompressed lineage relation.

    ``df`` has one scalar integer column per axis (``schema.full_cols``);
    duplicate rows are dropped first (set semantics). Returns the
    compressed interval table; with ``prune`` (default) each value
    attribute keeps exactly one representation, matching the paper's
    tables.
    """
    cols = list(schema.key_cols) + list(schema.val_cols)
    work = to_intervals(df.drop_duplicates(subset=list(schema.full_cols)), cols)
    # Step 1: multi-attribute range encoding over value attributes.
    for i in range(len(schema.val_cols) - 1, -1, -1):
        target = schema.val_cols[i]
        others = [c for c in cols if c != target]
        work = _encode_value_pass(work, target, others)
    # Step 2: relative value transformation (keys are still scalar here) …
    for v in schema.val_cols:
        for k in schema.key_cols:
            d = rg.delta(v, k)
            work[rg.lo(d)] = work[rg.lo(v)] - work[rg.lo(k)]
            work[rg.hi(d)] = work[rg.hi(v)] - work[rg.lo(k)]
    # … then range encoding over key attributes.
    for j in range(len(schema.key_cols) - 1, -1, -1):
        target = schema.key_cols[j]
        others = [c for c in schema.key_cols if c != target]
        work = _encode_key_pass(work, target, others, schema.val_cols, schema.key_cols)
    return finalize(work, schema) if prune else work


def finalize(cdf: pd.DataFrame, schema: LineageSchema) -> pd.DataFrame:
    """Prune each value attribute to a single representation.

    Absolute is preferred (paper pattern (2) over (3)); otherwise the
    first non-null delta is kept. All other representations are nulled.
    """
    cdf = cdf.copy()
    for v in schema.val_cols:
        cands = _candidates(v, schema.key_cols)
        chosen = np.full(len(cdf), -1)
        for ci, c in enumerate(cands):
            avail = ~np.isnan(cdf[rg.lo(c)].to_numpy())
            chosen = np.where((chosen == -1) & avail, ci, chosen)
        if (chosen == -1).any():
            raise ValueError(f"value attribute {v} has no representation in some rows")
        for ci, c in enumerate(cands):
            kill = chosen != ci
            if kill.any():
                cdf.loc[kill, [rg.lo(c), rg.hi(c)]] = np.nan
    return cdf


def representation_of(cdf: pd.DataFrame, v: str, schema: LineageSchema) -> pd.Series:
    """Per row, which representation a value attribute uses: 'abs' or a key name."""
    out = pd.Series("?", index=cdf.index)
    done = np.zeros(len(cdf), dtype=bool)
    for name, c in [("abs", v)] + [(k, rg.delta(v, k)) for k in schema.key_cols]:
        avail = ~np.isnan(cdf[rg.lo(c)].to_numpy()) & ~done
        out[avail] = name
        done |= avail
    if (out == "?").any():
        raise ValueError(f"value attribute {v} unrepresented")
    return out


def decompress(cdf: pd.DataFrame, schema: LineageSchema) -> pd.DataFrame:
    """Expand a compressed table back to the full lineage relation.

    Exact inverse of ``compress`` (losslessness, paper §IV.B): key ranges
    expand Cartesian-style; each value attribute expands from its absolute
    range or as ``key + delta`` per expanded key value. Output columns are
    ``schema.full_cols`` as int64, deduplicated and sorted.
    """
    if cdf.empty:
        return pd.DataFrame(
            {c: pd.Series(dtype="int64") for c in schema.full_cols}
        )
    work = cdf.copy().reset_index(drop=True)
    for k in schema.key_cols:
        work = rg.explode_interval(work, k, f"__{k}")
    parts = []
    reps = {v: representation_of(work, v, schema) for v in schema.val_cols}
    # Group rows by their joint representation pattern so each group can
    # be vectorized.
    if schema.val_cols:
        key = pd.concat(reps, axis=1).agg("|".join, axis=1)
    else:
        key = pd.Series("", index=work.index)
    for _, idx in key.groupby(key).groups.items():
        sub = work.loc[idx].copy()
        for v in schema.val_cols:
            rep = reps[v].loc[idx].iloc[0]
            if rep == "abs":
                pass  # interval already absolute
            else:
                d = rg.delta(v, rep)
                sub[rg.lo(v)] = sub[f"__{rep}"] + sub[rg.lo(d)]
                sub[rg.hi(v)] = sub[f"__{rep}"] + sub[rg.hi(d)]
            sub = rg.explode_interval(sub, v, f"__{v}")
        parts.append(sub)
    full = pd.concat(parts, ignore_index=True) if parts else work
    out = pd.DataFrame({c: full[f"__{c}"].astype("int64") for c in schema.full_cols})
    return (
        out.drop_duplicates()
        .sort_values(list(schema.full_cols), kind="mergesort")
        .reset_index(drop=True)
    )


def encode_query(cells: pd.DataFrame, cols: list[str]) -> pd.DataFrame:
    """Range-encode a query cell set into the compressed format (§V.B).

    ``cells`` has one scalar integer column per queried axis. The result
    is an interval table over the same columns, produced with the same
    multi-attribute range encoding as ProvRC step 1 — the paper's Q'.
    """
    work = to_intervals(cells.drop_duplicates(), cols)
    for i in range(len(cols) - 1, -1, -1):
        target = cols[i]
        others = [c for c in cols if c != target]
        work = _encode_value_pass(work, target, others)
    return work.reset_index(drop=True)
