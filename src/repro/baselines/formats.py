"""Baseline storage formats for full (uncompressed) lineage relations.

All writers take the full lineage relation as a pandas DataFrame of int64
index columns and return the file size in bytes; readers return the
relation. Sizes on these files are the Abs(MB) columns of Table VII.
"""
from __future__ import annotations

from pathlib import Path

import numpy as np
import pandas as pd
import pyarrow as pa
import pyarrow.parquet as pq


def write_raw(df: pd.DataFrame, path: str | Path) -> int:
    """Row-oriented uncompressed storage (paper's Raw / Ground-style).

    CSV keeps the row-major, text-per-tuple character of the paper's
    DuckDB row table export (~20 bytes/row for 4 small ints, matching
    Table VII's Raw magnitudes).
    """
    df.to_csv(path, index=False)
    return Path(path).stat().st_size


def read_raw(path: str | Path) -> pd.DataFrame:
    return pd.read_csv(path)


def write_array(df: pd.DataFrame, path: str | Path) -> int:
    """The Array baseline: lineage tuples as a dense int64 numpy matrix."""
    np.save(path, df.to_numpy(dtype="int64"), allow_pickle=False)
    return Path(path).stat().st_size


def read_array(path: str | Path, columns: list[str] | None = None) -> pd.DataFrame:
    arr = np.load(path, allow_pickle=False)
    cols = columns or [f"c{i}" for i in range(arr.shape[1])]
    return pd.DataFrame(arr, columns=cols)


def write_parquet(df: pd.DataFrame, path: str | Path, *, codec: str = "snappy") -> int:
    """Parquet with default encodings; ``codec='gzip'`` is Parquet-GZip."""
    table = pa.Table.from_pandas(df, preserve_index=False)
    pq.write_table(table, path, compression=codec)
    return Path(path).stat().st_size


def read_parquet(path: str | Path) -> pd.DataFrame:
    return pq.read_table(path).to_pandas()
