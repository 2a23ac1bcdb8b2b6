"""Columnar storage layer for the GDBMS reproduction (paper §4, §5).

Structures:

- :mod:`repro.storage.compression` — fixed-length codes: leading-0
  suppression and dictionary encoding.
- :mod:`repro.storage.null_compression` — Abadi bit-string NULL scheme
  enhanced with a simplified Jacobson rank index (constant-time access).
- :mod:`repro.storage.csr` — 2-level CSR adjacency lists for n-n edges.
- :mod:`repro.storage.vertex_column` — vertex columns for properties and
  single-cardinality edges.
- :mod:`repro.storage.property_pages` — single-indexed edge property pages.
- :mod:`repro.storage.edge_column` — randomly-ordered edge columns
  (the dominated baseline design point of §4.2).
- :mod:`repro.storage.rv_model` — byte accounting for GF-RV's row layout.
- :mod:`repro.storage.graph_store` — whole-graph store built from Spark
  DataFrames under a :class:`StorageConfig` (the Table 2 ablation axis).
"""

from repro.storage.graph_store import GraphStore, StorageConfig  # noqa: F401
