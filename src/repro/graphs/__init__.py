"""Property-graph substrate: schema, data container, synthetic datasets."""

from repro.graphs.schema import EdgeLabel, GraphSchema, PropSpec, VertexLabel  # noqa: F401
from repro.graphs.data import GraphData  # noqa: F401
