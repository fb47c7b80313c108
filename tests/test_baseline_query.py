"""Baseline query paths agree with the in-situ kernel on random pipelines."""
import numpy as np
import pandas as pd
import pytest

from repro.baselines.formats import write_array, write_parquet, write_raw
from repro.baselines.turborc import write_turborc
from repro.capture import patterns as pt
from repro.core import provrc
from repro.core.model import forward_schema
from repro.insitu.baseline_query import array_chain_query, duckdb_chain_query
from repro.insitu.theta_join import chain_query, intervals_to_cells


@pytest.fixture(scope="module")
def pipeline(tmp_path_factory):
    """3-step pipeline over a (12, 8) array with mixed op patterns."""
    root = tmp_path_factory.mktemp("pipe")
    shape = (12, 8)
    r1 = pt.identity(shape)
    r2 = pt.cumulative(shape, 1)
    g = np.random.default_rng(0)
    perm = g.permutation(shape[1])
    r3 = pt.index_map(shape, lambda o: [o[0], perm[o[1]]])  # column shuffle
    rels = [r1, r2, r3]
    paths = {}
    for fmt, writer, suffix in [
        ("raw", write_raw, "csv"),
        ("parquet", write_parquet, "parquet"),
        ("turborc", write_turborc, "trc"),
        ("array", write_array, "npy"),
    ]:
        paths[fmt] = []
        for i, rel in enumerate(rels):
            p = root / f"r{i}.{suffix}"
            writer(rel, p)
            paths[fmt].append(p)
    return shape, rels, paths


@pytest.fixture(scope="module")
def query_and_truth(pipeline):
    shape, rels, _ = pipeline
    q_cells = pd.DataFrame({"a0": [2, 2, 7], "a1": [1, 3, 5]})
    s = forward_schema(2, 2)
    tables = [(provrc.compress(r, s), s) for r in rels]
    q = provrc.encode_query(q_cells, ["a0", "a1"])
    truth = intervals_to_cells(chain_query(q, tables), ["b0", "b1"])
    return q_cells, truth


@pytest.mark.parametrize("fmt", ["raw", "parquet", "turborc"])
def test_duckdb_baselines_match_insitu(pipeline, query_and_truth, fmt):
    shape, rels, paths = pipeline
    q_cells, truth = query_and_truth
    got = duckdb_chain_query(paths[fmt], fmt, q_cells, 2)
    pd.testing.assert_frame_equal(got, truth, check_dtype=False)


def test_array_baseline_matches_insitu(pipeline, query_and_truth):
    shape, rels, paths = pipeline
    q_cells, truth = query_and_truth
    got = array_chain_query(paths["array"], q_cells, shape)
    pd.testing.assert_frame_equal(got, truth, check_dtype=False)
