"""Fig 7-style benchmark: compression latency vs input size, for the two
extreme lineage types (one-to-one element-wise and one-axis aggregation),
ProvRC-GZip against the columnar baselines. Latency covers capture-table
-> format conversion -> compression -> flush, as in the paper.
"""
import pytest

from repro.baselines.formats import write_parquet
from repro.baselines.turborc import write_turborc
from repro.capture import patterns as pt
from repro.core import provrc, storage
from repro.core.model import backward_schema

_SIZES = {"10k": 100, "90k": 300, "360k": 600}


def _rel(kind: str, n: int):
    return pt.identity((n, n)) if kind == "elementwise" else pt.reduce_axis((n, n), 1)


@pytest.mark.parametrize("kind", ["elementwise", "aggregate"])
@pytest.mark.parametrize("size", list(_SIZES))
def test_provrc_gzip_compression_latency(benchmark, tmp_path, kind, size):
    n = _SIZES[size]
    rel = _rel(kind, n)
    schema = backward_schema(1 if kind == "aggregate" else 2, 2)

    def run():
        cdf = provrc.compress(rel, schema)
        return storage.write(cdf, schema, tmp_path / "x.prc.gz", gzipped=True)

    benchmark.pedantic(run, rounds=2, iterations=1)


@pytest.mark.parametrize("fmt", ["parquet-gzip", "turborc"])
@pytest.mark.parametrize("kind", ["elementwise", "aggregate"])
def test_baseline_compression_latency(benchmark, tmp_path, fmt, kind):
    rel = _rel(kind, _SIZES["360k"])

    def run():
        if fmt == "parquet-gzip":
            return write_parquet(rel, tmp_path / "x.parquet", codec="gzip")
        return write_turborc(rel, tmp_path / "x.trc")

    benchmark.pedantic(run, rounds=2, iterations=1)
