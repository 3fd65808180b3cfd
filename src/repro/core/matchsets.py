"""Match sets (paper §4.1) as cached DataFrames.

``ms(q)`` of a pattern node is the inverted list of its label.
``ms(e)`` of a pattern edge (p,q) is the set of data-node pairs (u,v)
with matching labels such that (u,v) is an edge (child edge) or u ≺ v
(reachability edge). A :class:`MatchContext` owns the data graph, its
materialized reachability relation, and a per-(kind, labels) cache of
``ms(e)`` DataFrames so repeated sub-expressions are shared across
simulation passes, RIG construction, and the baselines — the
computation-sharing role RoaringBitmap adjacency lists play in the
paper's implementation.
"""
from __future__ import annotations

from dataclasses import dataclass, field

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.graphs.model import Graph
from repro.queries.pattern import CHILD, PEdge, Pattern
from repro.reach.closure import transitive_closure


@dataclass
class MatchContext:
    """Data graph + reachability relation + match-set cache."""

    graph: Graph
    reach: DataFrame = None
    _edge_ms: dict = field(default_factory=dict, repr=False)

    def __post_init__(self):
        if self.reach is None:
            self.reach = transitive_closure(self.graph.edges).cache()

    def ms_node(self, p: Pattern, q: int) -> DataFrame:
        """``ms(q)``: the inverted list of q's label, as ``(id)``."""
        return self.graph.inverted_list(p.label_of(q))

    def ms_edge(self, p: Pattern, e: PEdge) -> DataFrame:
        """``ms(e)``: label-filtered edge or reachability pairs ``(src,dst)``."""
        key = (e.kind, p.label_of(e.src), p.label_of(e.dst))
        if key not in self._edge_ms:
            base = self.graph.edges if e.kind == CHILD else self.reach
            src_ids = self.graph.inverted_list(key[1]).withColumnRenamed("id", "src")
            dst_ids = self.graph.inverted_list(key[2]).withColumnRenamed("id", "dst")
            self._edge_ms[key] = (
                base.join(F.broadcast(src_ids), "src")
                .join(F.broadcast(dst_ids), "dst")
                .select("src", "dst")
                .cache()
            )
        return self._edge_ms[key]

    def release(self) -> None:
        for df in self._edge_ms.values():
            df.unpersist()
        self._edge_ms.clear()
