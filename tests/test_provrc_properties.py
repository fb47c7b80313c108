"""Property-based tests (hypothesis) for ProvRC's paper §IV.B claims.

- compress |> decompress is the identity on any integer lineage relation
  (losslessness via union-of-Cartesian-products);
- in-situ queries over independent-pattern relations return exactly the
  ground-truth cell set;
- the query result is always a superset of ground truth (even for
  correlated-delta patterns, where exactness is not promised — DESIGN.md).
"""
import pandas as pd
from hypothesis import given, settings, strategies as st

from repro.core import provrc
from repro.core.model import backward_schema
from repro.insitu.theta_join import intervals_to_cells, theta_join

relation_1x1 = st.lists(
    st.tuples(st.integers(0, 12), st.integers(0, 12)),
    min_size=1,
    max_size=120,
).map(lambda rows: pd.DataFrame(rows, columns=["b0", "a0"]))

relation_1x2 = st.lists(
    st.tuples(st.integers(0, 8), st.integers(0, 8), st.integers(0, 5)),
    min_size=1,
    max_size=80,
).map(lambda rows: pd.DataFrame(rows, columns=["b0", "a0", "a1"]))

relation_2x1 = st.lists(
    st.tuples(st.integers(0, 6), st.integers(0, 6), st.integers(0, 10)),
    min_size=1,
    max_size=80,
).map(lambda rows: pd.DataFrame(rows, columns=["b0", "b1", "a0"]))


def _canon(df: pd.DataFrame) -> pd.DataFrame:
    return (
        df.drop_duplicates()
        .sort_values(list(df.columns), kind="mergesort")
        .reset_index(drop=True)
        .astype("int64")
    )


@settings(max_examples=60, deadline=None)
@given(relation_1x1)
def test_roundtrip_1x1(rel):
    schema = backward_schema(1, 1)
    back = provrc.decompress(provrc.compress(rel, schema), schema)
    pd.testing.assert_frame_equal(_canon(back), _canon(rel), check_dtype=False)


@settings(max_examples=40, deadline=None)
@given(relation_1x2)
def test_roundtrip_1x2(rel):
    schema = backward_schema(1, 2)
    back = provrc.decompress(provrc.compress(rel, schema), schema)
    pd.testing.assert_frame_equal(_canon(back), _canon(rel), check_dtype=False)


@settings(max_examples=40, deadline=None)
@given(relation_2x1)
def test_roundtrip_2x1(rel):
    schema = backward_schema(2, 1)
    back = provrc.decompress(provrc.compress(rel, schema), schema)
    pd.testing.assert_frame_equal(_canon(back), _canon(rel), check_dtype=False)


@settings(max_examples=40, deadline=None)
@given(relation_1x1, st.sets(st.integers(0, 12), min_size=1, max_size=5))
def test_query_exact_on_1x1(rel, q_keys):
    """With a single input axis no correlated deltas exist -> exact."""
    schema = backward_schema(1, 1)
    cdf = provrc.compress(rel, schema)
    q_cells = pd.DataFrame({"b0": sorted(q_keys)})
    q = provrc.encode_query(q_cells, ["b0"])
    got = intervals_to_cells(theta_join(q, cdf, schema), ["a0"])
    want = (
        rel[rel["b0"].isin(q_keys)][["a0"]]
        .drop_duplicates()
        .sort_values("a0")
        .reset_index(drop=True)
    )
    pd.testing.assert_frame_equal(got, want, check_dtype=False)


@settings(max_examples=40, deadline=None)
@given(relation_1x2, st.sets(st.integers(0, 8), min_size=1, max_size=4))
def test_query_superset_always_holds(rel, q_keys):
    schema = backward_schema(1, 2)
    cdf = provrc.compress(rel, schema)
    q_cells = pd.DataFrame({"b0": sorted(q_keys)})
    q = provrc.encode_query(q_cells, ["b0"])
    got = intervals_to_cells(theta_join(q, cdf, schema), ["a0", "a1"])
    want = rel[rel["b0"].isin(q_keys)][["a0", "a1"]].drop_duplicates()
    merged = want.merge(got, how="left", indicator=True)
    assert (merged["_merge"] == "both").all()
