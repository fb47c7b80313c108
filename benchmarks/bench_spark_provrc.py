"""Spark-parallel ProvRC benchmark: compression of a 360k-row aggregate
lineage relation through the per-partition applyInPandas path, plus the
Spark in-situ query path end to end. Demonstrates the paper's
"highly parallelizable" claim on the shuffle path (broadcast disabled)."""
import pandas as pd

from repro.capture import patterns as pt
from repro.core import provrc
from repro.core.model import backward_schema
from repro.core.spark_provrc import compress_spark
from repro.insitu.spark_query import collect_cells, query_to_spark, theta_join_spark


def test_spark_compress_aggregate(benchmark, spark):
    rel = pt.reduce_axis((600, 600), 1)
    sdf = spark.createDataFrame(rel)
    schema = backward_schema(1, 2)

    def run():
        return compress_spark(sdf, schema, n_buckets=32).count()

    n = benchmark.pedantic(run, rounds=1, iterations=1)
    assert n == 1  # full aggregate pattern collapses to a single row


def test_spark_insitu_query_end_to_end(benchmark, spark):
    rel = pt.reduce_axis((600, 600), 1)
    schema = backward_schema(1, 2)
    cdf_s = compress_spark(spark.createDataFrame(rel), schema, n_buckets=32)
    cdf_s = cdf_s.cache()
    cdf_s.count()
    q = provrc.encode_query(pd.DataFrame({"b0": list(range(50, 80))}), ["b0"])

    def run():
        return collect_cells(
            theta_join_spark(query_to_spark(spark, q), cdf_s, schema, bucket_width=128),
            ["a0", "a1"],
        )

    cells = benchmark.pedantic(run, rounds=1, iterations=1)
    assert len(cells) == 30 * 600
