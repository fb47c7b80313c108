"""Spark in-situ query path: bucketed range join, chained θ-joins with
merge, equivalence with the pandas kernel and the DuckDB oracle, and
Parquet predicate pushdown in the store.
"""
import numpy as np
import pandas as pd
import pytest

from repro.capture import patterns as pt
from repro.core import provrc
from repro.core.model import backward_schema, forward_schema
from repro.core.ranges import hi, lo
from repro.core.spark_provrc import compress_spark
from repro.insitu import store
from repro.insitu.range_join import bucketed_range_join
from repro.insitu.spark_query import (
    chain_query_spark,
    collect_cells,
    query_to_spark,
    theta_join_spark,
)
from repro.insitu.theta_join import chain_query, intervals_to_cells
from repro.oracle import assert_equivalent


class TestBucketedRangeJoin:
    def test_matches_naive_overlap(self, spark):
        g = np.random.default_rng(0)
        n = 80
        left = pd.DataFrame({"x_lo": g.integers(0, 200, n).astype("float64")})
        left["x_hi"] = left["x_lo"] + g.integers(0, 30, n)
        left = left.add_prefix("q__").assign(lid=np.arange(n))
        right = pd.DataFrame({"x_lo": g.integers(0, 200, n).astype("float64")})
        right["x_hi"] = right["x_lo"] + g.integers(0, 30, n)
        right = right.assign(rid=np.arange(n))
        got = (
            bucketed_range_join(
                spark.createDataFrame(left),
                spark.createDataFrame(right),
                ["x"],
                bucket_width=16,
            )
            .select("lid", "rid")
            .toPandas()
            .sort_values(["lid", "rid"])
            .reset_index(drop=True)
        )
        want_rows = [
            (l.lid, r.rid)
            for l in left.itertuples()
            for r in right.itertuples()
            if l.q__x_lo <= r.x_hi and r.x_lo <= l.q__x_hi
        ]
        want = (
            pd.DataFrame(want_rows, columns=["lid", "rid"])
            .sort_values(["lid", "rid"])
            .reset_index(drop=True)
        )
        pd.testing.assert_frame_equal(got, want, check_dtype=False)

    def test_no_duplicates_across_buckets(self, spark):
        # One wide interval spanning many buckets must match exactly once.
        left = pd.DataFrame({"q__x_lo": [0.0], "q__x_hi": [500.0], "lid": [0]})
        right = pd.DataFrame({"x_lo": [100.0], "x_hi": [400.0], "rid": [0]})
        got = bucketed_range_join(
            spark.createDataFrame(left),
            spark.createDataFrame(right),
            ["x"],
            bucket_width=32,
        ).count()
        assert got == 1


class TestSparkThetaJoin:
    def test_matches_kernel_single_step(self, spark):
        rel = pt.reduce_axis((50, 6), 1)
        schema = backward_schema(1, 2)
        cdf_s = compress_spark(spark.createDataFrame(rel), schema, n_buckets=8)
        q = provrc.encode_query(pd.DataFrame({"b0": [3, 4, 5, 20]}), ["b0"])
        got = collect_cells(
            theta_join_spark(query_to_spark(spark, q), cdf_s, schema, bucket_width=16),
            ["a0", "a1"],
        )
        want = intervals_to_cells(
            chain_query(q, [(provrc.compress(rel, schema), schema)]), ["a0", "a1"]
        )
        pd.testing.assert_frame_equal(got, want, check_dtype=False)

    def test_forward_chain_matches_duckdb(self, spark):
        """3-op forward pipeline, Spark in-situ vs DuckDB joins on raw."""
        n = 64
        r1 = pt.identity((n,))  # elementwise
        rows2 = [(i, j) for i in range(n) for j in range(max(0, i - 2), i + 1)]
        r2 = pd.DataFrame(rows2, columns=["b0", "a0"])  # trailing window
        r3 = pt.identity((n,))
        s = forward_schema(1, 1)
        tables = [
            (compress_spark(spark.createDataFrame(r), s, n_buckets=4), s)
            for r in (r1, r2, r3)
        ]
        q = provrc.encode_query(pd.DataFrame({"a0": [10, 11, 40]}), ["a0"])
        got_cells = collect_cells(
            chain_query_spark(spark, q, tables, bucket_width=16), ["b0"]
        )
        assert_equivalent(
            spark.createDataFrame(got_cells),
            """
            SELECT DISTINCT r3.b0 AS b0
            FROM r1 JOIN r2 ON r2.a0 = r1.b0
                    JOIN r3 ON r3.a0 = r2.b0
            WHERE r1.a0 IN (10, 11, 40)
            """,
            r1=r1,
            r2=r2,
            r3=r3,
        )

    def test_merge_vs_no_merge_same_cells(self, spark):
        rel = pt.cumulative((40,), 0)
        schema = backward_schema(1, 1)
        cdf_s = compress_spark(spark.createDataFrame(rel), schema, n_buckets=4)
        q = provrc.encode_query(pd.DataFrame({"b0": [7, 8, 30]}), ["b0"])
        qs = query_to_spark(spark, q)
        a = collect_cells(theta_join_spark(qs, cdf_s, schema, merge=True), ["a0"])
        b = collect_cells(theta_join_spark(qs, cdf_s, schema, merge=False), ["a0"])
        pd.testing.assert_frame_equal(a, b, check_dtype=False)


class TestStore:
    def test_roundtrip_and_pushdown(self, spark, tmp_path):
        rel = pt.reduce_axis((80, 5), 1)
        schema = backward_schema(1, 2)
        cdf_s = compress_spark(spark.createDataFrame(rel), schema, n_buckets=4)
        store.write_store(cdf_s, schema, tmp_path / "st")
        df, got_schema = store.open_store(spark, tmp_path / "st")
        assert got_schema == schema
        assert df.count() == cdf_s.count()
        scan = store.scan_with_pushdown(spark, tmp_path / "st", 10, 20)
        filters = store.pushed_filters(scan)
        assert "b0_hi" in filters or "b0_lo" in filters, filters
        rows = scan.toPandas()
        assert ((rows[hi("b0")] >= 10) & (rows[lo("b0")] <= 20)).all()

    def test_query_over_store(self, spark, tmp_path):
        rel = pt.identity((60, 4))
        schema = backward_schema(2, 2)
        cdf_s = compress_spark(spark.createDataFrame(rel), schema, n_buckets=4)
        store.write_store(cdf_s, schema, tmp_path / "st2")
        df, sch = store.open_store(spark, tmp_path / "st2")
        q = provrc.encode_query(
            pd.DataFrame([(5, 1), (5, 2), (6, 1)], columns=["b0", "b1"]),
            ["b0", "b1"],
        )
        got = collect_cells(
            theta_join_spark(query_to_spark(spark, q), df, sch, bucket_width=16),
            ["a0", "a1"],
        )
        want = pd.DataFrame(
            [(5, 1), (5, 2), (6, 1)], columns=["a0", "a1"]
        ).sort_values(["a0", "a1"]).reset_index(drop=True)
        pd.testing.assert_frame_equal(got, want, check_dtype=False)
