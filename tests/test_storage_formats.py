"""Round-trip and size-ordering tests for all storage formats (§VII.B)."""
import numpy as np
import pandas as pd
import pytest

from repro.baselines import (
    read_array,
    read_parquet,
    read_raw,
    read_turborc,
    write_array,
    write_parquet,
    write_raw,
    write_turborc,
)
from repro.core import provrc, storage
from repro.core.model import backward_schema


@pytest.fixture()
def elementwise_rel():
    """1:1 lineage of a 100x40 element-wise op — highly structured."""
    rows = [(i, j, i, j) for i in range(100) for j in range(40)]
    return pd.DataFrame(rows, columns=["b0", "b1", "a0", "a1"])


@pytest.fixture()
def random_rel():
    g = np.random.default_rng(0)
    return pd.DataFrame(
        {
            "b0": np.arange(4000),
            "a0": g.permutation(4000),
        }
    )


class TestBaselineRoundTrips:
    def test_raw_csv(self, tmp_path, elementwise_rel):
        p = tmp_path / "r.csv"
        size = write_raw(elementwise_rel, p)
        assert size > 0
        back = read_raw(p)
        pd.testing.assert_frame_equal(back, elementwise_rel, check_dtype=False)

    def test_array_npy(self, tmp_path, elementwise_rel):
        p = tmp_path / "r.npy"
        write_array(elementwise_rel, p)
        back = read_array(p, columns=list(elementwise_rel.columns))
        pd.testing.assert_frame_equal(back, elementwise_rel, check_dtype=False)

    @pytest.mark.parametrize("codec", ["snappy", "gzip"])
    def test_parquet(self, tmp_path, elementwise_rel, codec):
        p = tmp_path / "r.parquet"
        write_parquet(elementwise_rel, p, codec=codec)
        back = read_parquet(p)
        pd.testing.assert_frame_equal(back, elementwise_rel, check_dtype=False)

    def test_turborc(self, tmp_path, elementwise_rel, random_rel):
        for name, rel in [("e", elementwise_rel), ("r", random_rel)]:
            p = tmp_path / f"{name}.trc"
            write_turborc(rel, p)
            back = read_turborc(p)
            pd.testing.assert_frame_equal(back, rel, check_dtype=False)


class TestProvRCStorage:
    @pytest.mark.parametrize("gzipped", [False, True])
    def test_roundtrip_through_disk(self, tmp_path, elementwise_rel, gzipped):
        schema = backward_schema(2, 2)
        cdf = provrc.compress(elementwise_rel, schema)
        p = tmp_path / "l.prc"
        storage.write(cdf, schema, p, gzipped=gzipped)
        back_cdf, back_schema = storage.read(p)
        assert back_schema == schema
        full = provrc.decompress(back_cdf, back_schema)
        expect = elementwise_rel.sort_values(["b0", "b1", "a0", "a1"]).reset_index(
            drop=True
        )
        pd.testing.assert_frame_equal(full, expect, check_dtype=False)

    def test_unstructured_roundtrip(self, tmp_path, random_rel):
        schema = backward_schema(1, 1)
        cdf = provrc.compress(random_rel, schema)
        p = tmp_path / "l.prc"
        storage.write(cdf, schema, p, gzipped=True)
        back_cdf, back_schema = storage.read(p)
        full = provrc.decompress(back_cdf, back_schema)
        expect = random_rel.sort_values(["b0", "a0"]).reset_index(drop=True)
        pd.testing.assert_frame_equal(full, expect, check_dtype=False)

    def test_structured_lineage_size_ordering(self, tmp_path, elementwise_rel):
        """The paper's headline: ProvRC crushes baselines on structured ops."""
        schema = backward_schema(2, 2)
        cdf = provrc.compress(elementwise_rel, schema)
        assert len(cdf) == 1
        s_provrc = storage.write(cdf, schema, tmp_path / "l.prc")
        s_raw = write_raw(elementwise_rel, tmp_path / "r.csv")
        s_parquet = write_parquet(elementwise_rel, tmp_path / "r.parquet")
        s_turbo = write_turborc(elementwise_rel, tmp_path / "r.trc")
        assert s_provrc < s_parquet / 10
        assert s_provrc < s_turbo  # margin grows with scale (Table VII)
        assert s_provrc < s_raw / 100
