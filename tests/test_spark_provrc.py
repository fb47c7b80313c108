"""Spark-parallel ProvRC: equivalence with the pandas kernel, losslessness
through the Spark path, and the DuckDB oracle on query results.
"""
import numpy as np
import pandas as pd
import pytest

from repro.capture import patterns as pt
from repro.core import provrc
from repro.core.model import backward_schema
from repro.core.spark_provrc import collect_compressed, compress_spark
from repro.insitu.theta_join import intervals_to_cells, theta_join
from repro.oracle import assert_equivalent


def _canon_compressed(cdf: pd.DataFrame) -> pd.DataFrame:
    cdf = cdf[sorted(cdf.columns)].copy()
    return (
        cdf.sort_values(sorted(cdf.columns), kind="mergesort")
        .reset_index(drop=True)
    )


@pytest.mark.parametrize(
    "rel_fn,n_out,n_in",
    [
        (lambda: pt.identity((40, 25)), 2, 2),
        (lambda: pt.reduce_axis((40, 25), 1), 1, 2),
        (lambda: pt.cumulative((50,), 0), 1, 1),
        (
            lambda: pd.DataFrame(
                {
                    "b0": np.arange(300),
                    "a0": np.random.default_rng(0).permutation(300),
                }
            ),
            1,
            1,
        ),
    ],
    ids=["elementwise", "aggregate", "cumsum", "sort-like"],
)
def test_spark_matches_pandas_kernel(spark, rel_fn, n_out, n_in):
    rel = rel_fn()
    schema = backward_schema(n_out, n_in)
    want = provrc.compress(rel, schema)
    sdf = spark.createDataFrame(rel)
    got = collect_compressed(compress_spark(sdf, schema, n_buckets=8))
    pd.testing.assert_frame_equal(
        _canon_compressed(got), _canon_compressed(want), check_dtype=False
    )


def test_spark_roundtrip_lossless(spark):
    g = np.random.default_rng(3)
    rel = pd.DataFrame(
        {
            "b0": g.integers(0, 30, 500),
            "a0": g.integers(0, 30, 500),
            "a1": g.integers(0, 10, 500),
        }
    ).drop_duplicates()
    schema = backward_schema(1, 2)
    cdf = collect_compressed(
        compress_spark(spark.createDataFrame(rel), schema, n_buckets=8)
    )
    back = provrc.decompress(cdf, schema)
    expect = rel.sort_values(["b0", "a0", "a1"]).reset_index(drop=True)
    pd.testing.assert_frame_equal(back, expect, check_dtype=False)


def test_query_over_spark_compressed_matches_duckdb(spark):
    """End-to-end: Spark compression -> kernel θ-join -> DuckDB oracle."""
    rel = pt.reduce_axis((60, 8), 1)  # aggregate lineage
    schema = backward_schema(1, 2)
    cdf = collect_compressed(
        compress_spark(spark.createDataFrame(rel), schema, n_buckets=8)
    )
    q_cells = pd.DataFrame({"b0": [5, 6, 7, 30]})
    q = provrc.encode_query(q_cells, ["b0"])
    got_cells = intervals_to_cells(theta_join(q, cdf, schema), ["a0", "a1"])
    got_spark = spark.createDataFrame(got_cells)
    assert_equivalent(
        got_spark,
        "SELECT DISTINCT a0, a1 FROM rel WHERE b0 IN (5, 6, 7, 30)",
        rel=rel,
    )
