"""Property-graph schema (paper §2, §3 "partial structure").

The paper's Guideline 3 structure is first-class here: every vertex and
edge label declares its (structured) properties and every edge label its
cardinality, which drives the storage decisions of Table 1 and the
ID-component factoring of Fig 6.
"""
from __future__ import annotations

from dataclasses import dataclass, field

CARDINALITIES = ("n-n", "n-1", "1-n", "1-1")


@dataclass(frozen=True)
class PropSpec:
    """One structured property: name, dtype and whether it is categorical.

    ``dtype`` is one of ``int32``, ``int64``, ``float64``, ``str``.
    Categorical string properties are dictionary-encoded by the columnar
    store; non-categorical strings are stored as raw payloads.
    """

    name: str
    dtype: str = "int64"
    categorical: bool = False

    def __post_init__(self) -> None:
        if self.dtype not in ("int32", "int64", "float64", "str"):
            raise ValueError(f"unsupported dtype {self.dtype!r}")


@dataclass(frozen=True)
class VertexLabel:
    name: str
    props: tuple[PropSpec, ...] = ()

    def prop(self, name: str) -> PropSpec:
        for p in self.props:
            if p.name == name:
                return p
        raise KeyError(f"{self.name} has no property {name!r}")


@dataclass(frozen=True)
class EdgeLabel:
    """An edge label with fixed endpoint labels and a cardinality.

    ``n-1``: each source vertex has at most one out-edge (single
    cardinality forward). ``1-n``: each destination vertex has at most
    one in-edge. ``1-1``: both. ``n-n``: neither.
    """

    name: str
    src: str
    dst: str
    cardinality: str = "n-n"
    props: tuple[PropSpec, ...] = ()

    def __post_init__(self) -> None:
        if self.cardinality not in CARDINALITIES:
            raise ValueError(f"bad cardinality {self.cardinality!r}")

    @property
    def single_fwd(self) -> bool:
        """At most one out-edge per source (forward single cardinality)."""
        return self.cardinality in ("n-1", "1-1")

    @property
    def single_bwd(self) -> bool:
        """At most one in-edge per destination."""
        return self.cardinality in ("1-n", "1-1")

    def prop(self, name: str) -> PropSpec:
        for p in self.props:
            if p.name == name:
                return p
        raise KeyError(f"{self.name} has no property {name!r}")


@dataclass
class GraphSchema:
    vertices: dict[str, VertexLabel] = field(default_factory=dict)
    edges: dict[str, EdgeLabel] = field(default_factory=dict)

    def add_vertex(self, name: str, *props: PropSpec) -> VertexLabel:
        vl = VertexLabel(name, tuple(props))
        self.vertices[name] = vl
        return vl

    def add_edge(
        self,
        name: str,
        src: str,
        dst: str,
        cardinality: str = "n-n",
        *props: PropSpec,
    ) -> EdgeLabel:
        if src not in self.vertices or dst not in self.vertices:
            raise KeyError(f"edge {name}: unknown endpoint label")
        el = EdgeLabel(name, src, dst, cardinality, tuple(props))
        self.edges[name] = el
        return el
