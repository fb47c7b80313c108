"""On-disk binary format for ProvRC-compressed lineage tables (§VII.B).

The format stores, per row: every key interval (int32 lo/hi) and, per
value attribute, a one-byte representation code (0 = absolute, 1+j =
delta vs key axis j) plus the int32 lo/hi of the chosen representation —
exactly the information in the paper's finalized tables. ``ProvRC-GZip``
gzips the same payload; the paper applies it by default because it wins
on unstructured lineage at negligible cost for structured lineage.

Layout (little-endian), version 2:
  magic ``PRVC`` | version u8 | direction u8 (0=backward, 1=forward)
  | n_key u8 | n_val u8 | n_rows u64
  | key blocks: dlo[i32 x n] width[i32 x n] per key attribute
  | val blocks: rep[u8 x n] lo[i32 x n] width[i32 x n] per value attribute

Rows are sorted by the key lower bounds and each key's lo column is
delta-encoded (``dlo[0]`` absolute); widths are ``hi - lo``. For runs of
consecutive scalar keys (the dominant shape in semi-structured lineage,
e.g. Sort) the delta stream is all 1s and the width stream all 0s, which
the GZip stage then collapses — mirroring how the paper's ProvRC file
for Sort lands near the columnar baselines instead of above Raw.
"""
from __future__ import annotations

import gzip
import struct
from pathlib import Path

import numpy as np
import pandas as pd

from repro.core import ranges as rg
from repro.core.model import LineageSchema, backward_schema, forward_schema
from repro.core.provrc import representation_of

_MAGIC = b"PRVC"
_VERSION = 2


def _put_stream(parts: list[bytes], arr: np.ndarray) -> None:
    """Append a column stream with constant-run elision: a stream whose
    values are all equal stores one flag byte + one value (the dominant
    case for key deltas, widths and rep codes in semi-structured
    lineage)."""
    if len(arr) and (arr == arr.flat[0]).all():
        parts.append(b"\x01" + arr[:1].tobytes())
    else:
        parts.append(b"\x00" + arr.tobytes())


def _take_stream(buf: bytes, off: int, dtype: str, n: int) -> tuple[np.ndarray, int]:
    flag = buf[off]
    off += 1
    item = np.dtype(dtype).itemsize
    if flag == 1:
        val = np.frombuffer(buf, dtype=dtype, count=1, offset=off)
        off += item
        return np.full(n, val[0], dtype=dtype), off
    arr = np.frombuffer(buf, dtype=dtype, count=n, offset=off)
    off += arr.nbytes
    return arr, off


def serialize(cdf: pd.DataFrame, schema: LineageSchema) -> bytes:
    n = len(cdf)
    if n:
        cdf = cdf.sort_values(
            [rg.lo(k) for k in schema.key_cols], kind="mergesort"
        ).reset_index(drop=True)
    parts = [
        _MAGIC,
        struct.pack(
            "<BBBBQ",
            _VERSION,
            0 if schema.direction == "backward" else 1,
            schema.n_key,
            schema.n_val,
            n,
        ),
    ]
    for k in schema.key_cols:
        lo_v = cdf[rg.lo(k)].to_numpy().astype("int64")
        hi_v = cdf[rg.hi(k)].to_numpy().astype("int64")
        dlo = np.diff(lo_v, prepend=np.int64(0)) if n else lo_v
        _put_stream(parts, dlo.astype("<i4"))
        _put_stream(parts, (hi_v - lo_v).astype("<i4"))
    for v in schema.val_cols:
        if n:
            rep = representation_of(cdf, v, schema)
            code = np.zeros(n, dtype=np.uint8)
            v_lo = np.empty(n, dtype="<i4")
            v_hi = np.empty(n, dtype="<i4")
            for j, k in enumerate(schema.key_cols):
                m = (rep == k).to_numpy()
                code[m] = 1 + j
                d = rg.delta(v, k)
                v_lo[m] = cdf.loc[m, rg.lo(d)].to_numpy().astype("<i4")
                v_hi[m] = cdf.loc[m, rg.hi(d)].to_numpy().astype("<i4")
            m = (rep == "abs").to_numpy()
            v_lo[m] = cdf.loc[m, rg.lo(v)].to_numpy().astype("<i4")
            v_hi[m] = cdf.loc[m, rg.hi(v)].to_numpy().astype("<i4")
        else:
            code = np.zeros(0, dtype=np.uint8)
            v_lo = np.zeros(0, dtype="<i4")
            v_hi = np.zeros(0, dtype="<i4")
        width = (v_hi.astype("int64") - v_lo.astype("int64")).astype("<i4")
        _put_stream(parts, code)
        _put_stream(parts, np.asarray(v_lo, dtype="<i4"))
        _put_stream(parts, width)
    return b"".join(parts)


def deserialize(buf: bytes) -> tuple[pd.DataFrame, LineageSchema]:
    if buf[:4] != _MAGIC:
        raise ValueError("not a ProvRC file")
    version, direction, n_key, n_val, n = struct.unpack("<BBBBQ", buf[4:16])
    if version != _VERSION:
        raise ValueError(f"unsupported version {version}")
    schema = (
        backward_schema(n_key, n_val)
        if direction == 0
        else forward_schema(n_val, n_key)
    )
    off = 16
    cols: dict[str, np.ndarray] = {}

    def take(dtype, count):
        nonlocal off
        arr, off2 = _take_stream(buf, off, dtype, count)
        off = off2
        return arr

    for k in schema.key_cols:
        dlo = take("<i4", n).astype("int64")
        width = take("<i4", n).astype("int64")
        lo_v = np.cumsum(dlo)
        cols[rg.lo(k)] = lo_v.astype("float64")
        cols[rg.hi(k)] = (lo_v + width).astype("float64")
    cdf = pd.DataFrame(cols)
    for v in schema.val_cols:
        code = take("u1", n)
        v_lo = take("<i4", n).astype("float64")
        v_hi = v_lo + take("<i4", n).astype("float64")
        for c in [v] + [rg.delta(v, k) for k in schema.key_cols]:
            cdf[rg.lo(c)] = np.nan
            cdf[rg.hi(c)] = np.nan
        m = code == 0
        cdf.loc[m, rg.lo(v)] = v_lo[m]
        cdf.loc[m, rg.hi(v)] = v_hi[m]
        for j, k in enumerate(schema.key_cols):
            m = code == 1 + j
            d = rg.delta(v, k)
            cdf.loc[m, rg.lo(d)] = v_lo[m]
            cdf.loc[m, rg.hi(d)] = v_hi[m]
    return cdf, schema


def write(cdf: pd.DataFrame, schema: LineageSchema, path: str | Path, *, gzipped: bool = False) -> int:
    """Write a compressed table; returns bytes on disk."""
    payload = serialize(cdf, schema)
    if gzipped:
        payload = gzip.compress(payload, compresslevel=6)
    Path(path).write_bytes(payload)
    return len(payload)


def read(path: str | Path) -> tuple[pd.DataFrame, LineageSchema]:
    buf = Path(path).read_bytes()
    if buf[:2] == b"\x1f\x8b":  # gzip magic
        buf = gzip.decompress(buf)
    return deserialize(buf)
