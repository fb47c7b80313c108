"""Core contribution of the paper: the ProvRC compression algorithm.

Modules:

- ``ranges``:  vectorized interval / run-scan primitives shared by the
  compression kernel and the in-situ query processor.
- ``model``:   naming conventions for lineage relations and their
  compressed representation (lo/hi pairs, delta columns).
- ``provrc``:  the pandas/numpy ProvRC kernel — multi-attribute range
  encoding, relative value transformation, decompression, and query
  encoding. Exact per-paper semantics; unit-tested against the paper's
  worked examples (Tables I-VI).
- ``spark_provrc``: Spark-parallel compression built on the kernel
  (per-group ``applyInPandas``, one pass per attribute).
- ``storage``: the on-disk binary format for compressed tables and its
  GZip variant (ProvRC / ProvRC-GZip in Table VII).
"""
from repro.core.model import LineageSchema, backward_schema, forward_schema  # noqa: F401
from repro.core.provrc import compress, decompress, encode_query, finalize  # noqa: F401
