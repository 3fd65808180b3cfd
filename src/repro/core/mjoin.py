"""MJoin (paper §5): multi-way intersection enumeration over a RIG.

Algorithm 5 extends partial occurrences one *query node* at a time: at
step i it intersects cos(q_i) with the RIG adjacency lists of every
already-bound neighbour, and only then binds q_i. The dataflow
analogue: the running partial-occurrence DataFrame is extended by
joining the first incident RIG edge relation (which introduces the new
column ``q{i}``) and then *constrained in the same step* by left-semi
joins against every other incident edge relation — a multi-way
intersection realized as one Catalyst stage per query node, never
materializing a partial result that violates any constraint among
bound nodes. This is the worst-case-optimal, node-at-a-time join style
(vs. JM's edge-at-a-time binary joins, repro.baselines.jm).

Output columns are ``q{node_id}`` (one per pattern node), matching the
oracle SQL of repro.queries.sql, so results diff directly.
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.core.rig import RIG
from repro.harness.runner import Guard
from repro.queries.sql import col_name


def _edge_rel(rig: RIG, e, new_is_dst: bool) -> DataFrame:
    """cos(e) projected as (bound_col, new_col) in join orientation."""
    bound, new = ("src", "dst") if new_is_dst else ("dst", "src")
    return rig.cos_edges[e].select(
        F.col(bound).alias("_b"), F.col(new).alias("_n")
    )


def mjoin(
    rig: RIG,
    order: list[int],
    *,
    limit: int | None = None,
    guard: Guard | None = None,
    partial_cap: int | None = None,
) -> DataFrame:
    """Enumerate Q(G) from the RIG along ``order``; returns a DataFrame.

    Lazy by construction — the caller triggers execution (collect /
    count / limit). ``limit`` caps enumeration like the paper's 10^7
    match cap. ``guard.tick`` is called per extension step with the
    running partial-match cardinality when a guard is provided (guarded
    mode materializes each step; unguarded mode stays fully lazy and
    lets Catalyst pipeline the whole multi-way join).

    ``partial_cap`` bounds every partial-occurrence relation with an
    in-plan ``limit``: the set-oriented analogue of the paper's bounded
    backtracking enumeration (expansion stops once enough partial
    matches exist to fill the match limit), and the reason a lazy
    multi-way join over a near-complete reachability closure cannot
    blow up mid-plan. Only for capped-enumeration harness runs — with
    a cap the result is a subset of Q(G), never a superset;
    correctness tests must not set it.
    """
    p = rig.pattern
    assert sorted(order) == sorted(p.node_ids()), "order must permute query nodes"
    first = order[0]
    partial = rig.cos[first].select(F.col("id").alias(col_name(first)))
    bound = [first]
    for q in order[1:]:
        incident = [
            (e, e.src != q)  # new_is_dst: q is the head of e
            for e in p.incident(q)
            if (e.src if e.dst == q else e.dst) in bound
        ]
        if not incident:
            # Disconnected prefix (only for pathological orders):
            # Cartesian extension, as in Algorithm 5 with empty N_i.
            partial = partial.crossJoin(
                rig.cos[q].select(F.col("id").alias(col_name(q)))
            )
            bound.append(q)
            continue
        (e0, new_is_dst0), rest = incident[0], incident[1:]
        other0 = e0.src if new_is_dst0 else e0.dst
        rel0 = _edge_rel(rig, e0, new_is_dst0)
        partial = (
            partial.join(rel0, partial[col_name(other0)] == rel0["_b"])
            .withColumnRenamed("_n", col_name(q))
            .drop("_b")
        )
        for e, new_is_dst in rest:
            other = e.src if new_is_dst else e.dst
            rel = _edge_rel(rig, e, new_is_dst)
            partial = partial.join(
                rel,
                (partial[col_name(other)] == rel["_b"])
                & (partial[col_name(q)] == rel["_n"]),
                "leftsemi",
            )
        bound.append(q)
        if partial_cap is not None:
            partial = partial.limit(partial_cap)  # lazy in-plan bound
        if guard is not None:
            partial = partial.localCheckpoint(eager=True)
            guard.tick(partial.count())
    cols = [col_name(q) for q in p.node_ids()]
    out = partial.select(*cols)
    if limit is not None:
        out = out.limit(limit)
    return out
