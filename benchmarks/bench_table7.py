"""Table VII benchmark: compression sizes for all 12 ops at bench scale.

The kernel-only ops run in one harness invocation; the two relational
ops (Group By / Inner Join) capture their lineage through Spark SQL.
Printed output is the paper-style Rel % table (ours | paper); the
captured numbers are recorded in EXPERIMENTS.md.
"""
import pandas as pd
import pytest

from repro.experiments import table7

_KERNEL_OPS = [
    "Negative", "Addition", "Aggregate", "Repetition", "Matrix*Vector",
    "Matrix*Matrix", "Sort", "ImgFilter", "Lime", "DRISE",
]


def test_table7_kernel_ops(benchmark, tmp_path):
    def run():
        return table7.run_table7(tmp_path, scale="bench", ops=_KERNEL_OPS)

    df = benchmark.pedantic(run, rounds=1, iterations=1)
    print("\n" + table7.format_table(df))
    # Shape checks against the paper: ProvRC dominates structured ops.
    for op in ["Negative", "Aggregate", "Repetition", "Matrix*Matrix", "ImgFilter"]:
        sub = df[df["op"] == op].set_index("format")
        assert sub.loc["ProvRC", "rel_pct"] < 1.0, op
        assert (
            sub.loc["ProvRC", "bytes"]
            < min(sub.loc["Parquet", "bytes"], sub.loc["Turbo-RC", "bytes"]) / 5
        ), op
    # Sort is the worst case: no ProvRC win, GZip variants comparable.
    sort = df[df["op"] == "Sort"].set_index("format")
    assert sort.loc["ProvRC", "rel_pct"] > 10
    df.to_csv(tmp_path / "table7_kernel.csv", index=False)


def test_table7_relational_ops(benchmark, tmp_path, spark):
    def run():
        return table7.run_table7(
            tmp_path, scale="bench", spark=spark, ops=["Group By", "Inner Join"]
        )

    df = benchmark.pedantic(run, rounds=1, iterations=1)
    print("\n" + table7.format_table(df))
    gb = df[df["op"] == "Group By"].set_index("format")
    ij = df[df["op"] == "Inner Join"].set_index("format")
    # Paper shape: the sorted-key join compresses far better than the
    # unsorted group-by; GZip rescues group-by.
    assert ij.loc["ProvRC", "rel_pct"] < gb.loc["ProvRC", "rel_pct"] / 2
    assert gb.loc["ProvRC-GZip", "rel_pct"] < gb.loc["ProvRC", "rel_pct"]
