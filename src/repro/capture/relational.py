"""Custom relational operators with cell-level lineage capture (§VII.A.3).

The paper implements 'group-by' and 'inner-join' operations that record
the lineage of individual cells on execution, over the IMDB tables. A
relational table is viewed as a 2-D array: rows in canonical (sorted)
order x attributes in schema order (paper §II.A).

The relational work (grouping, joining, output ordering) runs in Spark
SQL; the row-pair-to-cell expansion is vectorized numpy on the collected
row maps (a table has few columns, so cells = rows x columns stays
linear in the lineage size).
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, functions as F, Window

from repro.capture.model import CapturedLineage


def _cells_from_row_map(
    out_rows: np.ndarray, in_rows: np.ndarray, out_cols: list[int], in_cols: list[int]
) -> pd.DataFrame:
    """Expand (output row <- input row) pairs into cell-level lineage for
    the given (output column <- input column) positional pairs."""
    n = len(out_rows)
    k = len(out_cols)
    b0 = np.repeat(out_rows, k)
    a0 = np.repeat(in_rows, k)
    b1 = np.tile(np.asarray(out_cols, dtype="int64"), n)
    a1 = np.tile(np.asarray(in_cols, dtype="int64"), n)
    return pd.DataFrame({"b0": b0, "b1": b1, "a0": a0, "a1": a1})


def groupby_lineage(
    df: DataFrame, key_col: str, agg_cols: list[str]
) -> tuple[DataFrame, CapturedLineage]:
    """Group-by with SUM aggregates, capturing cell lineage on execution.

    The input array is (n_rows x n_attrs) with attributes in ``df.columns``
    order; the output array is (n_groups x (1 + len(agg_cols))) with the
    key first, groups in sorted key order. Each output cell's lineage is
    the corresponding column's cells of the group's input rows (the key
    cell also descends from the group's key cells).
    """
    cols = df.columns
    w_in = Window.orderBy(*[F.col(c) for c in cols])
    with_idx = df.withColumn("__row", F.row_number().over(w_in) - F.lit(1))
    w_grp = Window.orderBy(key_col)
    groups = (
        df.groupBy(key_col)
        .agg(*[F.sum(c).alias(c) for c in agg_cols])
        .withColumn("__out", F.row_number().over(w_grp) - F.lit(1))
    )
    out_df = groups.select(key_col, *agg_cols, "__out")
    row_map = (
        with_idx.select(key_col, "__row")
        .join(groups.select(key_col, "__out"), on=key_col)
        .select("__out", "__row")
        .toPandas()
    )
    out_rows = row_map["__out"].to_numpy()
    in_rows = row_map["__row"].to_numpy()
    in_pos = {c: i for i, c in enumerate(cols)}
    out_cols = list(range(1 + len(agg_cols)))
    in_cols = [in_pos[key_col]] + [in_pos[c] for c in agg_cols]
    rel = _cells_from_row_map(out_rows, in_rows, out_cols, in_cols)
    cap = CapturedLineage(
        out_shape=(int(groups.count()), 1 + len(agg_cols)),
        in_shapes=((int(df.count()), len(cols)),),
        relations=[rel],
    )
    return out_df, cap


def inner_join_lineage(
    left: DataFrame, right: DataFrame, key: str
) -> tuple[DataFrame, CapturedLineage]:
    """Inner join capturing per-input cell lineage.

    Output attributes are left's columns followed by right's non-key
    columns; output rows ordered by (key, left row, right row). Each
    output cell descends from the input cell it was copied from (the key
    column descends from both key cells).
    """
    lcols, rcols = left.columns, right.columns
    w_l = Window.orderBy(*[F.col(c) for c in lcols])
    w_r = Window.orderBy(*[F.col(c) for c in rcols])
    li = left.withColumn("__l", F.row_number().over(w_l) - F.lit(1))
    ri = right.withColumn("__r", F.row_number().over(w_r) - F.lit(1))
    joined = li.join(ri, on=key)
    w_o = Window.orderBy(key, "__l", "__r")
    joined = joined.withColumn("__o", F.row_number().over(w_o) - F.lit(1))
    out_cols = lcols + [c for c in rcols if c != key]
    out_df = joined.select(*out_cols, "__o")
    row_map = joined.select("__o", "__l", "__r").toPandas()
    o = row_map["__o"].to_numpy()
    l_rows = row_map["__l"].to_numpy()
    r_rows = row_map["__r"].to_numpy()
    l_pos = {c: i for i, c in enumerate(lcols)}
    r_pos = {c: i for i, c in enumerate(rcols)}
    # Left relation: output cols 0..len(lcols)-1 copy left's columns.
    rel_left = _cells_from_row_map(
        o, l_rows, list(range(len(lcols))), [l_pos[c] for c in lcols]
    )
    # Right relation: the key output cell also descends from right's key;
    # right's non-key columns land after left's.
    r_out_cols = [out_cols.index(key)] + [
        out_cols.index(c) for c in rcols if c != key
    ]
    r_in_cols = [r_pos[key]] + [r_pos[c] for c in rcols if c != key]
    rel_right = _cells_from_row_map(o, r_rows, r_out_cols, r_in_cols)
    n_out = int(joined.count())
    cap = CapturedLineage(
        out_shape=(n_out, len(out_cols)),
        in_shapes=(
            (int(left.count()), len(lcols)),
            (int(right.count()), len(rcols)),
        ),
        relations=[rel_left, rel_right],
    )
    return out_df, cap
