"""Spark-parallel ProvRC compression (paper §VII.C.2: "ProvRC is highly
parallelizable, so we expect significant performance gains from a
multi-threaded implementation").

Parallelization is semantics-preserving because every merge performed by
an encoding pass happens inside a group whose key columns are exactly
equal; bucketing rows by a hash of those key columns therefore never
splits a merge group, and the pandas kernel re-groups by exact values
inside each bucket. Concretely:

- step-1 passes (value encoding) all group on "every key column equal"
  (plus other value columns, handled inside the kernel), so one shuffle
  on ``hash(key columns)`` parallelizes the whole phase;
- each step-2 pass on key ``k_j`` groups on the *other* key columns, so
  it gets its own shuffle on ``hash(other keys)``; with a single key
  axis the pass is one global group (a genuinely sequential scan — the
  paper's worst case, e.g. Sort).

The output is a Spark DataFrame of interval columns (doubles, NaN =
absent representation), collectable into the pandas kernel's compressed
format or persisted via ``insitu.store``.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, functions as F

from repro.core import ranges as rg
from repro.core.model import LineageSchema
from repro.core import provrc

_BUCKET = "__bucket"


def interval_columns(schema: LineageSchema) -> list[str]:
    cols = []
    for c in list(schema.key_cols) + list(schema.val_cols):
        cols += [rg.lo(c), rg.hi(c)]
    for v in schema.val_cols:
        for k in schema.key_cols:
            d = rg.delta(v, k)
            cols += [rg.lo(d), rg.hi(d)]
    return cols


def interval_schema_str(schema: LineageSchema) -> str:
    return ", ".join(f"`{c}` double" for c in interval_columns(schema))


def _ensure_all_columns(pdf: pd.DataFrame, schema: LineageSchema) -> pd.DataFrame:
    for c in interval_columns(schema):
        if c not in pdf.columns:
            pdf[c] = np.nan
    return pdf[interval_columns(schema)]


def compress_spark(
    df: DataFrame, schema: LineageSchema, *, n_buckets: int = 64
) -> DataFrame:
    """Compress a full lineage relation (integer columns per axis) with
    ProvRC, executing every encoding pass per-partition in executors."""
    spark = df.sparkSession
    key_cols = list(schema.key_cols)
    val_cols = list(schema.val_cols)
    out_schema = interval_schema_str(schema)

    df = df.dropDuplicates(list(schema.full_cols))

    # Phase A: all step-1 (value) passes, bucketed by the key columns.
    def step1(pdf: pd.DataFrame) -> pd.DataFrame:
        pdf = pdf.drop(columns=[_BUCKET])
        work = provrc.to_intervals(pdf, key_cols + val_cols)
        for i in range(len(val_cols) - 1, -1, -1):
            target = val_cols[i]
            others = [c for c in key_cols + val_cols if c != target]
            work = provrc._encode_value_pass(work, target, others)
        # Relative value transformation (keys are scalar inside phase A).
        for v in val_cols:
            for k in key_cols:
                d = rg.delta(v, k)
                work[rg.lo(d)] = work[rg.lo(v)] - work[rg.lo(k)]
                work[rg.hi(d)] = work[rg.hi(v)] - work[rg.lo(k)]
        return _ensure_all_columns(work, schema)

    bucketed = df.withColumn(
        _BUCKET, F.pmod(F.xxhash64(*[F.col(c) for c in key_cols]), F.lit(n_buckets))
    )
    work = bucketed.groupBy(_BUCKET).applyInPandas(step1, out_schema)

    # Phase B: one shuffle + kernel pass per key attribute.
    def _make_key_pass(target: str, others: list[str]):
        def key_pass(pdf: pd.DataFrame) -> pd.DataFrame:
            pdf = pdf.drop(columns=[_BUCKET])
            out = provrc._encode_key_pass(
                pdf, target, others, tuple(val_cols), tuple(key_cols)
            )
            return _ensure_all_columns(out, schema)

        return key_pass

    for j in range(len(key_cols) - 1, -1, -1):
        target = key_cols[j]
        others = [c for c in key_cols if c != target]
        key_pass = _make_key_pass(target, others)

        if others:
            bucket = F.pmod(
                F.xxhash64(*[F.col(rg.lo(c)) for c in others] + [F.col(rg.hi(c)) for c in others]),
                F.lit(n_buckets),
            )
        else:
            bucket = F.lit(0)
        work = (
            work.withColumn(_BUCKET, bucket)
            .groupBy(_BUCKET)
            .applyInPandas(key_pass, out_schema)
        )

    # Finalize: prune each value attribute to one representation
    # (partition-local, no shuffle).
    def fin(it):
        for pdf in it:
            if len(pdf):
                yield _ensure_all_columns(provrc.finalize(pdf, schema), schema)

    return work.mapInPandas(fin, out_schema)


def collect_compressed(cdf: DataFrame) -> pd.DataFrame:
    """Collect a Spark compressed table into the pandas kernel format."""
    return cdf.toPandas()
