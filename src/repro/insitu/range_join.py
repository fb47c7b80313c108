"""Bucketed (band) range join on Spark's shuffle path.

The θ-join needs an interval-overlap join. With broadcast joins disabled
session-wide (conftest), a plain non-equi join degenerates to a nested-
loop/cartesian plan, so we implement the standard band-join technique the
paper cites ([3], Databricks range-join optimization): explode each
interval into coarse buckets of width W on a primary attribute, equi-join
on the bucket id (shuffle hash join), and keep a match only in the first
bucket both intervals share — duplicate-free without a distinct. Residual
overlap predicates cover the remaining attributes.
"""
from __future__ import annotations

from pyspark.sql import DataFrame, functions as F

from repro.core import ranges as rg


def bucketed_range_join(
    left: DataFrame,
    right: DataFrame,
    attrs: list[str],
    *,
    bucket_width: int = 64,
    left_prefix: str = "q__",
) -> DataFrame:
    """Join rows whose intervals overlap on every attribute in ``attrs``.

    ``left`` columns for attribute ``x`` are ``{left_prefix}x_lo/hi``;
    ``right`` uses plain ``x_lo/hi``. The first attribute is the bucketing
    (primary) attribute; the rest are residual filters. Returns the inner
    join with both sides' columns (bucket column dropped).
    """
    primary = attrs[0]
    w = int(bucket_width)
    l_lo, l_hi = f"{left_prefix}{rg.lo(primary)}", f"{left_prefix}{rg.hi(primary)}"
    r_lo, r_hi = rg.lo(primary), rg.hi(primary)

    lb = left.withColumn(
        "__bucket",
        F.explode(
            F.sequence(
                F.floor(F.col(l_lo) / w), F.floor(F.col(l_hi) / w)
            )
        ),
    )
    rb = right.withColumn(
        "__bucket",
        F.explode(
            F.sequence(
                F.floor(F.col(r_lo) / w), F.floor(F.col(r_hi) / w)
            )
        ),
    )
    cond = [lb["__bucket"] == rb["__bucket"]]
    for a in attrs:
        cond.append(lb[f"{left_prefix}{rg.lo(a)}"] <= rb[rg.hi(a)])
        cond.append(rb[rg.lo(a)] <= lb[f"{left_prefix}{rg.hi(a)}"])
    # Dedup guard: emit the pair only from the first shared bucket.
    cond.append(
        lb["__bucket"]
        == F.floor(F.greatest(lb[l_lo], rb[r_lo]) / w)
    )
    joined = lb.join(rb, on=cond, how="inner")
    return joined.drop(lb["__bucket"]).drop(rb["__bucket"])
