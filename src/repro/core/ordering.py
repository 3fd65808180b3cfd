"""Search-order strategies for MJoin (paper §5.2, §7.4 "Search order").

* ``jo_order`` — JO: greedy join ordering [26] driven by RIG statistics:
  start at the query node with the smallest cos(q); repeatedly append
  the connected node with the smallest cos(q). Connectivity avoids
  Cartesian blowups; RIG cardinalities give better estimates than raw
  inverted lists (the paper's refinement of [26]).
* ``ri_order`` — RI [9]: purely topological. Start at the node of
  maximum degree; repeatedly append the node with the most edges into
  the ordered prefix, tie-broken by edges to neighbours of the prefix,
  then by degree. Data-independent by design.
* ``bj_order`` — BJ: exact dynamic programming over connected left-deep
  orders, minimizing estimated intermediate cardinalities under an
  independence model seeded with RIG node/edge counts. O(2^n) states —
  the paper's point is that this is unscalable for tens of nodes, which
  the guard in the Table 3/4 harness exposes.
"""
from __future__ import annotations

from repro.core.rig import RIG
from repro.harness.runner import Guard
from repro.queries.pattern import Pattern


def jo_order(rig: RIG) -> list[int]:
    p = rig.pattern
    counts = rig.node_counts
    order = [min(p.node_ids(), key=lambda q: (counts[q], q))]
    remaining = set(p.node_ids()) - set(order)
    while remaining:
        frontier = [q for q in remaining if p.neighbors(q) & set(order)]
        pool = frontier or sorted(remaining)  # disconnected fallback
        nxt = min(pool, key=lambda q: (counts[q], q))
        order.append(nxt)
        remaining.remove(nxt)
    return order


def ri_order(p: Pattern) -> list[int]:
    order = [max(p.node_ids(), key=lambda q: (p.undirected_degree(q), -q))]
    remaining = set(p.node_ids()) - set(order)
    while remaining:
        ordered = set(order)
        nb_of_ordered = set().union(*(p.neighbors(q) for q in order)) - ordered

        def score(q):
            vis = len(p.neighbors(q) & ordered)
            nig = len(p.neighbors(q) & nb_of_ordered)
            return (vis, nig, p.undirected_degree(q), -q)

        nxt = max(remaining, key=score)
        order.append(nxt)
        remaining.remove(nxt)
    return order


def _selectivity(rig: RIG) -> dict:
    """Per-edge selectivity |cos(e)| / (|cos(src)|*|cos(dst)|)."""
    sel = {}
    for e, ce in rig.edge_counts.items():
        denom = rig.node_counts[e.src] * rig.node_counts[e.dst]
        sel[e] = (ce / denom) if denom else 0.0
    return sel


def estimated_cost(rig: RIG, order: list[int]) -> float:
    """Sum of estimated intermediate sizes of a left-deep order.

    Independence model: card(prefix+q) = card(prefix) * |cos(q)| *
    product of selectivities of edges newly covered by q.
    """
    sel = _selectivity(rig)
    card = 1.0
    total = 0.0
    bound: set[int] = set()
    for q in order:
        card *= max(1, rig.node_counts[q])
        for e in rig.pattern.incident(q):
            other = e.dst if e.src == q else e.src
            if other in bound:
                card *= sel[e]
        bound.add(q)
        total += card
    return total


def bj_order(rig: RIG, *, guard: Guard | None = None) -> list[int]:
    """Exact DP over connected left-deep orders (exponential in n)."""
    p = rig.pattern
    ids = p.node_ids()
    idx = {q: i for i, q in enumerate(ids)}
    nb_mask = {
        q: sum(1 << idx[nb] for nb in p.neighbors(q)) for q in ids
    }
    sel = _selectivity(rig)
    # state: frozen set of bound nodes (bitmask) -> (cost, card, order)
    states: dict[int, tuple[float, float, tuple[int, ...]]] = {}
    for q in ids:
        c = float(max(1, rig.node_counts[q]))
        states[1 << idx[q]] = (c, c, (q,))
    for _ in range(len(ids) - 1):
        nxt_states: dict[int, tuple[float, float, tuple[int, ...]]] = {}
        for mask, (cost, card, order) in states.items():
            if guard is not None:
                guard.tick()
            for q in ids:
                b = 1 << idx[q]
                if mask & b or not (nb_mask[q] & mask):
                    continue
                new_card = card * max(1, rig.node_counts[q])
                for e in p.incident(q):
                    other = e.dst if e.src == q else e.src
                    if mask & (1 << idx[other]):
                        new_card *= sel[e]
                key = mask | b
                new_cost = cost + new_card
                if key not in nxt_states or new_cost < nxt_states[key][0]:
                    nxt_states[key] = (new_cost, new_card, order + (q,))
        states = nxt_states or states
    full = (1 << len(ids)) - 1
    if full in states:
        return list(states[full][2])
    return jo_order(rig)  # disconnected pattern fallback


def pick_order(method: str, rig: RIG, *, guard: Guard | None = None) -> list[int]:
    if method == "jo":
        return jo_order(rig)
    if method == "ri":
        return ri_order(rig.pattern)
    if method == "bj":
        return bj_order(rig, guard=guard)
    raise ValueError(f"unknown order method {method!r}")
