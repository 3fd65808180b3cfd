"""TM: the tree-based baseline (paper §1, §7.1; [59]-style).

TM extracts a spanning tree of the query, evaluates the tree pattern
(joins in BFS discovery order — every join is a parent-child extension,
so tree evaluation itself never cross-joins), then post-filters the
tree solutions against every non-tree edge's match relation. Its
failure mode (paper: mostly TO) is a huge tree-solution set when the
non-tree edges are the selective ones — all that work is materialized
before the filters apply; the guard reproduces it.
"""
from __future__ import annotations

from collections import deque

from pyspark.sql import DataFrame

from repro.baselines.jm import edge_relations
from repro.core.matchsets import MatchContext
from repro.harness.runner import Guard
from repro.queries.pattern import Pattern, PEdge
from repro.queries.sql import col_name


def spanning_tree(p: Pattern) -> tuple[list[PEdge], list[PEdge]]:
    """BFS spanning tree (undirected traversal, original edge kept).

    Root = max-undirected-degree node. Returns (tree edges in discovery
    order, non-tree edges).
    """
    root = max(p.node_ids(), key=lambda q: (p.undirected_degree(q), -q))
    seen = {root}
    tree: list[PEdge] = []
    queue = deque([root])
    while queue:
        q = queue.popleft()
        for e in sorted(p.incident(q), key=lambda e: (e.src, e.dst)):
            nb = e.dst if e.src == q else e.src
            if nb not in seen:
                seen.add(nb)
                tree.append(e)
                queue.append(nb)
    non_tree = [e for e in p.edges if e not in tree]
    return tree, non_tree


def tm(
    ctx: MatchContext,
    p: Pattern,
    *,
    prefilter: bool = True,
    limit: int | None = None,
    guard: Guard | None = None,
) -> DataFrame:
    """Evaluate the spanning tree, then filter by the missing edges."""
    rels = edge_relations(ctx, p, prefilter=prefilter, guard=guard)
    tree, non_tree = spanning_tree(p)

    first = tree[0] if tree else p.edges[0]
    partial = rels[first].select(
        rels[first]["src"].alias(col_name(first.src)),
        rels[first]["dst"].alias(col_name(first.dst)),
    )
    bound = {first.src, first.dst}
    for e in tree[1:]:
        rel = rels[e].select(
            rels[e]["src"].alias("_es"), rels[e]["dst"].alias("_ed")
        )
        if e.src in bound:
            partial = (
                partial.join(rel, partial[col_name(e.src)] == rel["_es"])
                .withColumnRenamed("_ed", col_name(e.dst))
                .drop("_es")
            )
            bound.add(e.dst)
        else:
            partial = (
                partial.join(rel, partial[col_name(e.dst)] == rel["_ed"])
                .withColumnRenamed("_es", col_name(e.src))
                .drop("_ed")
            )
            bound.add(e.src)
        # The tree-solution relation is materialized in full before any
        # non-tree filter runs — TM's documented bottleneck.
        partial = partial.localCheckpoint(eager=True)
        if guard is not None:
            guard.tick(partial.count())
    for e in non_tree:
        rel = rels[e].select(
            rels[e]["src"].alias("_es"), rels[e]["dst"].alias("_ed")
        )
        partial = partial.join(
            rel,
            (partial[col_name(e.src)] == rel["_es"])
            & (partial[col_name(e.dst)] == rel["_ed"]),
            "leftsemi",
        )
    out = partial.select(*[col_name(q) for q in p.node_ids()])
    if limit is not None:
        out = out.limit(limit)
    return out
