"""Double simulation (paper §4.2-§4.4) as DataFrame fixpoints.

The double simulation ``FB`` of a query Q by a graph G is the largest
relation S ⊆ V_Q × V_G whose pairs satisfy label equality plus forward
(every out-edge of q has a matching successor/descendant in S) and
backward (every in-edge has a matching predecessor/ancestor) conditions
— with edge-to-path matches for reachability edges (Def. 1).

We keep one candidate DataFrame ``FB(q) = (id)`` per query node and
prune it with semi-joins against ``ms(e)`` relations until a fixpoint:

* :func:`fb_sim_bas` — FBSimBas: per pass, forward-prune every edge in
  arbitrary (insertion) order, then backward-prune every edge.
* :func:`fb_sim_dag` — FBSimDag: per pass, traverse query nodes in
  reverse topological order (forward sim) then topological order
  (backward sim). Same fixpoint, fewer passes in practice (paper §4.4).
* :func:`fb_sim` — FBSim / "Dag+Δ": decompose a cyclic pattern into a
  spanning DAG plus back edges, alternate FBSimDag passes on the DAG
  with FBSimBas passes on the back edges.

Candidates shrink monotonically, so per-node cardinalities are a
sufficient convergence certificate; each pass materializes candidates
via ``localCheckpoint`` to keep Catalyst plans bounded. ``max_passes``
implements §4.5's approximation (the paper fixes N=3: most redundant
nodes die in the first 2-3 passes); ``None`` runs to the exact
fixpoint. Approximation never loses answers — any superset of os(q)
remains a valid RIG node set (Def. 4.1).
"""
from __future__ import annotations

from dataclasses import dataclass, field

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.core.matchsets import MatchContext
from repro.harness.runner import Guard
from repro.queries.pattern import Pattern, PEdge


@dataclass
class SimResult:
    """Final FB sets, per-node cardinalities, and passes to converge."""

    fb: dict[int, DataFrame]
    counts: dict[int, int]
    passes: int
    converged: bool
    algorithm: str = "fbsim"

    @property
    def empty(self) -> bool:
        return any(c == 0 for c in self.counts.values())


def _initial(ctx: MatchContext, p: Pattern) -> dict[int, DataFrame]:
    return {q: ctx.ms_node(p, q) for q in p.node_ids()}


def _materialize(fb: dict[int, DataFrame]) -> dict[int, int]:
    """Checkpoint all candidate sets in ONE job and count them in one more.

    The per-node sets are tagged and unioned so each pass costs O(1)
    Spark actions instead of O(|V_Q|) — the difference between ~5s and
    ~60s per simulation on 20-node patterns. The per-node views handed
    back are cheap filters over the checkpointed union.
    """
    qs = sorted(fb)
    combined = None
    for q in qs:
        tagged = fb[q].select(F.lit(q).alias("_q"), "id")
        combined = tagged if combined is None else combined.unionByName(tagged)
    combined = combined.localCheckpoint(eager=True)
    counted = {
        r["_q"]: r["n"]
        for r in combined.groupBy("_q").agg(F.count("*").alias("n")).collect()
    }
    counts = {}
    for q in qs:
        fb[q] = combined.where(F.col("_q") == q).select("id")
        counts[q] = int(counted.get(q, 0))
    return counts


def _forward_prune(ctx: MatchContext, p: Pattern, fb: dict, e: PEdge) -> None:
    """Drop v from FB(e.src) lacking a partner in FB(e.dst) via ms(e)."""
    ms = ctx.ms_edge(p, e)
    valid = ms.join(fb[e.dst], ms["dst"] == fb[e.dst]["id"], "leftsemi").select("src")
    fb[e.src] = fb[e.src].join(
        valid, fb[e.src]["id"] == valid["src"], "leftsemi"
    )


def _backward_prune(ctx: MatchContext, p: Pattern, fb: dict, e: PEdge) -> None:
    """Drop v from FB(e.dst) lacking a partner in FB(e.src) via ms(e)."""
    ms = ctx.ms_edge(p, e)
    valid = ms.join(fb[e.src], ms["src"] == fb[e.src]["id"], "leftsemi").select("dst")
    fb[e.dst] = fb[e.dst].join(
        valid, fb[e.dst]["id"] == valid["dst"], "leftsemi"
    )


def _run_passes(
    ctx, p, one_pass, *, max_passes, guard: Guard | None, algorithm: str
) -> SimResult:
    """Shared driver loop: init, iterate ``one_pass`` until stable."""
    fb = _initial(ctx, p)
    counts = _materialize(fb)
    passes = 0
    converged = False
    while max_passes is None or passes < max_passes:
        if any(c == 0 for c in counts.values()):
            converged = True  # empty FB: early termination (§4.3 example)
            break
        one_pass(fb)
        new_counts = _materialize(fb)
        passes += 1
        if guard is not None:
            guard.tick(max(new_counts.values()))
        if new_counts == counts:
            converged = True
            break
        counts = new_counts
    return SimResult(fb=fb, counts=counts, passes=passes, converged=converged, algorithm=algorithm)


def fb_sim_bas(
    ctx: MatchContext, p: Pattern, *, max_passes: int | None = None,
    guard: Guard | None = None, edges: tuple | None = None,
) -> SimResult:
    """FBSimBas (Algorithm 1): edge-order forward then backward prunes.

    ``edges`` restricts the pass to a subset (used by FBSim for Δ).
    """
    es = edges if edges is not None else p.edges

    def one_pass(fb):
        for e in es:
            _forward_prune(ctx, p, fb, e)
        for e in es:
            _backward_prune(ctx, p, fb, e)

    return _run_passes(ctx, p, one_pass, max_passes=max_passes, guard=guard, algorithm="bas")


def fb_sim_dag(
    ctx: MatchContext, p: Pattern, *, max_passes: int | None = None,
    guard: Guard | None = None,
) -> SimResult:
    """FBSimDag (Algorithm 2): topological-order passes, DAG patterns only."""
    topo = p.topological_order()
    if topo is None:
        raise ValueError("FBSimDag requires a DAG pattern; use fb_sim")

    def one_pass(fb):
        for q in reversed(topo):  # bottom-up: forward simulation
            for e in p.out_edges(q):
                _forward_prune(ctx, p, fb, e)
        for q in topo:  # top-down: backward simulation
            for e in p.in_edges(q):
                _backward_prune(ctx, p, fb, e)

    return _run_passes(ctx, p, one_pass, max_passes=max_passes, guard=guard, algorithm="dag")


def fb_sim(
    ctx: MatchContext, p: Pattern, *, max_passes: int | None = None,
    guard: Guard | None = None,
) -> SimResult:
    """FBSim (Algorithm 3): FBSimDag when Q is a DAG, else Dag+Δ.

    For cyclic patterns: one combined pass runs a DAG-ordered sweep over
    the spanning-DAG edges followed by a FBSimBas-style sweep over the
    back edges; the outer loop repeats until FB stabilizes.
    """
    if p.is_dag():
        return fb_sim_dag(ctx, p, max_passes=max_passes, guard=guard)

    dag_edges, back_edges = p.dag_decomposition()
    p_dag = p.with_edges(dag_edges)
    topo = p_dag.topological_order()

    def one_pass(fb):
        for q in reversed(topo):
            for e in p_dag.out_edges(q):
                _forward_prune(ctx, p, fb, e)
        for q in topo:
            for e in p_dag.in_edges(q):
                _backward_prune(ctx, p, fb, e)
        for e in back_edges:
            _forward_prune(ctx, p, fb, e)
        for e in back_edges:
            _backward_prune(ctx, p, fb, e)

    return _run_passes(ctx, p, one_pass, max_passes=max_passes, guard=guard, algorithm="dag+delta")


ALGORITHMS = {"bas": fb_sim_bas, "dag": fb_sim_dag, "auto": fb_sim}
