"""Engine simulators for the paper's §7.5 system comparison.

The real comparators (GraphflowDB, EmptyHeaded, Neo4j) are unavailable
JVM/C++ engines, so we simulate each on the same Spark substrate,
preserving the cost structure the paper attributes to it (see DESIGN.md
"Substitutions"):

* **GF** (GraphflowDB [38]) — must build a *catalog* of subgraph
  cardinalities before answering anything. We materialize the
  label-path statistics (timed) and model the catalog's memory
  footprint as ``L^2*|V| + L*|E|`` entries (per-vertex per-label-pair
  extension statistics — what GF's catalog stores); the entry count is
  checked against the guard's row cap, reproducing the paper's
  out-of-memory failures on many-label graphs (Fig. 16(a)). Query
  evaluation is a WCO join directly on the data graph (no reachability
  support: D-queries require a caller-materialized transitive closure,
  exactly the paper's workaround).
* **EH** (EmptyHeaded [4]) — expensive precomputation (materializes
  every query-edge relation, timed separately) then a WCO probe;
  reported as EH (precompute + probe) and EH-probe (probe only),
  matching Table 5's two rows.
* **Neo4j** — binary joins in syntactic edge order: no global join
  optimizer, no pruning, reachability edges via the reach relation
  (the APOC-expansion analogue). Guarded per step -> TO on the queries
  Neo4j cannot finish.
"""
from __future__ import annotations

import time
from dataclasses import dataclass

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.core.matchsets import MatchContext
from repro.core.mjoin import mjoin
from repro.core.ordering import jo_order
from repro.core.rig import build_rig
from repro.harness.runner import Guard, RowCap
from repro.queries.pattern import CHILD, Pattern
from repro.queries.sql import col_name


# ---------------------------------------------------------------------------
# GF-like
# ---------------------------------------------------------------------------
@dataclass
class Catalog:
    """GF's precomputed subgraph-cardinality statistics."""

    label_pair_counts: dict
    entries_modeled: int
    build_seconds: float


def build_catalog(ctx: MatchContext, *, guard: Guard | None = None) -> Catalog:
    """Materialize label-path statistics; OM when the modeled footprint
    (L^2*V + L*E entries) exceeds the guard's row cap."""
    t0 = time.perf_counter()
    g = ctx.graph
    n_v = g.nodes.count()
    n_e = g.edges.count()
    n_l = g.nodes.select("label").distinct().count()
    entries = n_l * n_l * n_v + n_l * n_e
    if guard is not None:
        guard.tick(entries)  # raises RowCap -> reported as OM

    lbl = g.nodes.select(F.col("id"), F.col("label"))
    e1 = (
        g.edges.join(lbl.withColumnsRenamed({"id": "src", "label": "ls"}), "src")
        .join(lbl.withColumnsRenamed({"id": "dst", "label": "ld"}), "dst")
    )
    pair_counts = {
        (r["ls"], r["ld"]): r["n"]
        for r in e1.groupBy("ls", "ld").agg(F.count("*").alias("n")).collect()
    }
    # 2-edge path statistics (the expensive part of a real catalog).
    p2 = (
        e1.alias("a")
        .join(g.edges.alias("b"), F.col("a.dst") == F.col("b.src"))
        .groupBy(F.col("a.ls"), F.col("a.ld"))
        .agg(F.count("*").alias("n"))
    )
    p2.collect()
    return Catalog(
        label_pair_counts=pair_counts,
        entries_modeled=entries,
        build_seconds=time.perf_counter() - t0,
    )


def gf(
    ctx: MatchContext,
    p: Pattern,
    *,
    limit: int | None = None,
    guard: Guard | None = None,
) -> DataFrame:
    """GF query evaluation: WCO join straight on the data graph.

    Child edges only — callers evaluating D-queries must hand in a
    MatchContext whose graph edges are the materialized transitive
    closure (with every pattern edge downgraded to CHILD).
    """
    if any(e.kind != CHILD for e in p.edges):
        raise ValueError("GF cannot map edges to paths; materialize the TC first")
    rig = build_rig(ctx, p, sim=None, guard=guard)  # match RIG: no pruning
    return mjoin(rig, jo_order(rig), limit=limit, guard=guard)


def child_only_on_closure(p: Pattern) -> Pattern:
    """Rewrite every edge to CHILD — valid when edges are the closure."""
    return p.with_edges(
        [type(e)(e.src, e.dst, CHILD) for e in p.edges], name=p.name + "-tc"
    )


# ---------------------------------------------------------------------------
# EH-like
# ---------------------------------------------------------------------------
def eh(
    ctx: MatchContext,
    p: Pattern,
    *,
    limit: int | None = None,
    guard: Guard | None = None,
) -> tuple[DataFrame, float]:
    """EmptyHeaded: full edge-relation precomputation, then WCO probe.

    Returns ``(answer_df, precompute_seconds)`` so Table 5 can report
    both EH (with precomputation) and EH-probe (without).
    """
    t0 = time.perf_counter()
    for e in p.edges:  # materialize + count every relation up front
        n = ctx.ms_edge(p, e).count()
        if guard is not None:
            guard.tick(n)
    pre = time.perf_counter() - t0
    rig = build_rig(ctx, p, sim=None, guard=guard)
    return mjoin(rig, jo_order(rig), limit=limit, guard=guard), pre


# ---------------------------------------------------------------------------
# Neo4j-like
# ---------------------------------------------------------------------------
def neo4j(
    ctx: MatchContext,
    p: Pattern,
    *,
    limit: int | None = None,
    guard: Guard | None = None,
) -> DataFrame:
    """Binary joins in syntactic order, no reordering, no pruning."""
    first = p.edges[0]
    rels = {e: ctx.ms_edge(p, e) for e in p.edges}
    partial = rels[first].select(
        F.col("src").alias(col_name(first.src)),
        F.col("dst").alias(col_name(first.dst)),
    )
    bound = {first.src, first.dst}
    pending = list(p.edges[1:])
    while pending:
        # Cypher-style expansion: take the next edge touching the bound
        # prefix (Neo4j never reorders globally).
        e = next((x for x in pending if x.src in bound or x.dst in bound), pending[0])
        pending.remove(e)
        rel = rels[e].select(F.col("src").alias("_es"), F.col("dst").alias("_ed"))
        conds = []
        if e.src in bound:
            conds.append(partial[col_name(e.src)] == rel["_es"])
        if e.dst in bound:
            conds.append(partial[col_name(e.dst)] == rel["_ed"])
        if conds:
            cond = conds[0]
            for c in conds[1:]:
                cond = cond & c
            partial = partial.join(rel, cond)
        else:
            partial = partial.crossJoin(rel)
        if e.src not in bound:
            partial = partial.withColumnRenamed("_es", col_name(e.src))
        if e.dst not in bound:
            partial = partial.withColumnRenamed("_ed", col_name(e.dst))
        partial = partial.drop("_es", "_ed").localCheckpoint(eager=True)
        bound |= {e.src, e.dst}
        if guard is not None:
            guard.tick(partial.count())
    out = partial.select(*[col_name(q) for q in p.node_ids()])
    if limit is not None:
        out = out.limit(limit)
    return out
