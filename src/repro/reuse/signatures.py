"""Operation signatures, index reshaping, and automatic reuse prediction.

Three mappings, increasingly general (paper §VI):

- ``base_sig(op, in_arrs, args)``      — reuse for identical named inputs;
- ``dim_sig(op, in_shapes, args)``     — reuse when only shapes match
  (lineage is value-independent);
- ``gen_sig(op, args)``                — reuse for *any* input shape via
  "index reshaping": every interval equal to a full axis extent
  ``[0, d-1]`` in the compressed table is replaced by a symbolic
  dimension, and instantiating new shapes rebuilds the lineage with no
  capture at all.

``ReuseIndex`` implements the paper's automatic prediction: temporary
mappings are stored on first registration and promoted to permanent
after ``m`` confirming calls (gen_sig additionally requires a different
shape); a non-matching confirmation marks the signature not-reusable.
With the paper's ``m = 1``, promotions are cheap but can mispredict —
``np.cross`` (whose pattern depends on the last-dimension size) is the
paper's one observed error, reproduced in the tests.
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np
import pandas as pd

from repro.core import provrc
from repro.core import ranges as rg
from repro.core.model import LineageSchema, backward_schema

Shapes = tuple[tuple[int, ...], ...]


def _schema_for(rel: pd.DataFrame) -> LineageSchema:
    n_out = sum(1 for c in rel.columns if c.startswith("b"))
    n_in = sum(1 for c in rel.columns if c.startswith("a"))
    return backward_schema(n_out, n_in)


def _flat_dims(in_shapes: Shapes) -> list[int]:
    return [d for s in in_shapes for d in s]


@dataclass
class GeneralizedTable:
    """A compressed lineage table with full-extent intervals symbolized.

    ``marks`` lists (row position, attribute, dim index): that row's
    interval on that attribute equals ``[0, dims[dim] - 1]`` at capture
    time and is re-instantiated from the new shapes on reuse.
    """

    template: pd.DataFrame
    schema: LineageSchema
    marks: list[tuple[int, str, int]]
    captured_shapes: Shapes


def generalize(cdf: pd.DataFrame, schema: LineageSchema, in_shapes: Shapes) -> GeneralizedTable:
    """Index reshaping (paper Fig 6): symbolize full-extent intervals."""
    dims = _flat_dims(in_shapes)
    marks: list[tuple[int, str, int]] = []
    attrs = list(schema.key_cols) + list(schema.val_cols)
    for pos in range(len(cdf)):
        for a in attrs:
            lo_v = cdf.iloc[pos][rg.lo(a)]
            hi_v = cdf.iloc[pos][rg.hi(a)]
            if np.isnan(lo_v):
                continue
            if lo_v == 0:
                for di, d in enumerate(dims):
                    if hi_v == d - 1:
                        marks.append((pos, a, di))
                        break
    return GeneralizedTable(
        template=cdf.reset_index(drop=True).copy(),
        schema=schema,
        marks=marks,
        captured_shapes=tuple(tuple(s) for s in in_shapes),
    )


def instantiate(gen: GeneralizedTable, in_shapes: Shapes) -> pd.DataFrame:
    """Rebuild a concrete compressed table for new input shapes."""
    dims = _flat_dims(in_shapes)
    old_dims = _flat_dims(gen.captured_shapes)
    if len(dims) != len(old_dims):
        raise ValueError("axis count mismatch")
    out = gen.template.copy()
    for pos, a, di in gen.marks:
        out.loc[pos, rg.hi(a)] = dims[di] - 1
    return out


def _relations_equal(x: pd.DataFrame, y: pd.DataFrame) -> bool:
    if set(x.columns) != set(y.columns):
        return False
    cols = sorted(x.columns)
    cx = x[cols].drop_duplicates().sort_values(cols).reset_index(drop=True)
    cy = y[cols].drop_duplicates().sort_values(cols).reset_index(drop=True)
    return cx.astype("int64").equals(cy.astype("int64"))


@dataclass
class _SigState:
    status: str = "pending"  # pending | permanent | blocked
    stored: list = field(default_factory=list)  # per-input payloads
    shapes: Shapes | None = None


@dataclass
class ObserveResult:
    dim_status: str
    gen_status: str
    dim_hit: bool = False
    gen_hit: bool = False
    error: bool = False  # a permanent mapping predicted wrong lineage


class ReuseIndex:
    """Automatic reuse prediction over repeated register_operation calls."""

    def __init__(self, m: int = 1):
        self.m = m
        self._dim: dict[tuple, _SigState] = {}
        self._gen: dict[tuple, _SigState] = {}

    def observe(
        self,
        op_name: str,
        op_args: tuple,
        in_shapes: Shapes,
        relations: list[pd.DataFrame],
    ) -> ObserveResult:
        """Register one call's captured lineage; update predictions.

        ``relations`` is the ground-truth captured lineage (one relation
        per input). Returns hit/error flags for the evaluation harness.
        """
        in_shapes = tuple(tuple(s) for s in in_shapes)
        res_dim = self._observe_dim(op_name, op_args, in_shapes, relations)
        res_gen = self._observe_gen(op_name, op_args, in_shapes, relations)
        return ObserveResult(
            dim_status=res_dim[0],
            gen_status=res_gen[0],
            dim_hit=res_dim[1],
            gen_hit=res_gen[1],
            error=res_dim[2] or res_gen[2],
        )

    # -- dim_sig ---------------------------------------------------------
    def _observe_dim(self, op, args, shapes, relations):
        key = (op, args, shapes)
        st = self._dim.get(key)
        if st is None:
            self._dim[key] = _SigState(stored=[r.copy() for r in relations])
            return "pending", False, False
        if st.status == "blocked":
            return "blocked", False, False
        match = len(st.stored) == len(relations) and all(
            _relations_equal(a, b) for a, b in zip(st.stored, relations)
        )
        if st.status == "permanent":
            return ("permanent", True, not match)
        if match:
            st.status = "permanent"
            return "permanent", True, False
        st.status = "blocked"
        return "blocked", False, False

    # -- gen_sig ---------------------------------------------------------
    def _observe_gen(self, op, args, shapes, relations):
        key = (op, args)
        st = self._gen.get(key)
        if st is None:
            gens = []
            for rel in relations:
                schema = _schema_for(rel)
                cdf = provrc.compress(rel, schema)
                gens.append(generalize(cdf, schema, shapes))
            self._gen[key] = _SigState(stored=gens, shapes=shapes)
            return "pending", False, False
        if st.status == "blocked":
            return "blocked", False, False
        if st.status == "pending" and shapes == st.shapes:
            # The paper requires confirming calls with *different* shapes.
            return "pending", False, False
        match = self._gen_matches(st.stored, shapes, relations)
        if st.status == "permanent":
            return "permanent", True, not match
        if match:
            st.status = "permanent"
            return "permanent", True, False
        st.status = "blocked"
        return "blocked", False, False

    @staticmethod
    def _gen_matches(gens: list[GeneralizedTable], shapes, relations) -> bool:
        if len(gens) != len(relations):
            return False
        for gen, rel in zip(gens, relations):
            schema = _schema_for(rel)
            if schema != gen.schema:
                return False
            try:
                predicted = provrc.decompress(instantiate(gen, shapes), gen.schema)
            except (ValueError, KeyError):
                return False
            if not _relations_equal(predicted, rel):
                return False
        return True
