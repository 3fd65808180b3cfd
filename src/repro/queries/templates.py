"""Query workloads: the 20 pattern templates of the paper's Fig. 7.

The paper evaluates three query sets per dataset — C (child-only),
H (hybrid, ~50% reachability edges), D (descendant-only) — instantiated
from 20 structural templates grouped into four classes: acyclic,
cyclic, clique, and combo (undirected graph with > 2 cycles). Fig. 7's
exact drawings are not machine-readable from the text, so we define 20
representative templates honouring the class grouping the evaluation
references (e.g. Table 5 lists CQ0/3/5 as acyclic, CQ6/8/17 cyclic,
CQ11/12/19 clique — with HQ19 the 7-clique — and CQ10/13/16 combo).

A template fixes structure; :func:`instantiate` assigns labels
(deterministic in ``seed``) and edge kinds (C/H/D). Biology workloads
use :func:`random_pattern` (the paper uses randomly generated queries
of 4..32 nodes there).
"""
from __future__ import annotations

import random

from repro.queries.pattern import CHILD, DESC, Pattern, PEdge

# Structural templates: id -> (class, edge list). Node ids are 0..k-1.
_T = {
    # --- acyclic (trees / dags, no undirected cycle) ---
    0: ("acyclic", [(0, 1), (0, 2), (1, 3), (2, 4)]),                      # tree, 5n
    1: ("acyclic", [(0, 1), (1, 2), (2, 3)]),                              # path, 4n
    2: ("acyclic", [(0, 1), (0, 2), (0, 3), (1, 4), (1, 5)]),              # tree, 6n
    3: ("acyclic", [(0, 1), (1, 2), (1, 3), (3, 4), (3, 5), (5, 6)]),      # tree, 7n
    4: ("acyclic", [(0, 2), (1, 2), (2, 3), (2, 4)]),                      # dag flower, 5n
    5: ("acyclic", [(0, 1), (0, 2), (2, 3), (2, 4), (4, 5)]),              # tree, 6n
    # --- cyclic (exactly one / two undirected cycles) ---
    6: ("cyclic", [(0, 1), (0, 2), (1, 3), (2, 3)]),                       # diamond, 4n
    7: ("cyclic", [(0, 1), (1, 2), (2, 3), (0, 3), (3, 4)]),               # square+tail, 5n
    8: ("cyclic", [(0, 1), (1, 2), (0, 2), (2, 3), (3, 4)]),               # triangle+path, 5n
    9: ("cyclic", [(0, 1), (1, 2), (2, 0)]),                               # directed triangle, 3n
    17: ("cyclic", [(0, 1), (0, 2), (1, 3), (2, 3), (3, 4), (4, 5)]),      # diamond+path, 6n
    # --- clique (complete undirected graph) ---
    11: ("clique", [(i, j) for i in range(4) for j in range(i + 1, 4)]),   # 4-clique
    12: ("clique", [(i, j) for i in range(5) for j in range(i + 1, 5)]),   # 5-clique
    19: ("clique", [(i, j) for i in range(7) for j in range(i + 1, 7)]),   # 7-clique
    # --- combo (> 2 undirected cycles) ---
    10: ("combo", [(0, 1), (0, 2), (1, 3), (2, 3), (1, 2), (3, 4), (0, 4)]),
    13: ("combo", [(0, 1), (0, 2), (1, 2), (1, 3), (2, 3), (3, 4), (4, 5), (2, 5)]),
    14: ("combo", [(0, 1), (1, 2), (0, 2), (2, 3), (3, 4), (2, 4), (4, 5), (5, 0)]),
    15: ("combo", [(0, 1), (0, 2), (1, 3), (2, 3), (0, 3), (3, 4), (2, 4)]),
    16: ("combo", [(0, 1), (1, 2), (2, 3), (3, 0), (0, 2), (1, 3), (3, 4)]),
    18: ("combo", [(0, 1), (0, 2), (1, 2), (2, 3), (2, 4), (3, 4), (4, 5), (3, 5)]),
}

TEMPLATE_IDS = sorted(_T)
CLASSES = ("acyclic", "cyclic", "clique", "combo")


def template_class(tid: int) -> str:
    return _T[tid][0]


def templates_by_class(cls: str) -> list[int]:
    return [tid for tid in TEMPLATE_IDS if _T[tid][0] == cls]


def _edge_kinds(n_edges: int, qtype: str, rnd: random.Random) -> list[str]:
    if qtype == "C":
        return [CHILD] * n_edges
    if qtype == "D":
        return [DESC] * n_edges
    if qtype == "H":  # ~50% of edges become reachability edges
        kinds = [DESC if i % 2 == 0 else CHILD for i in range(n_edges)]
        rnd.shuffle(kinds)
        return kinds
    raise ValueError(f"bad query type {qtype!r}; use 'C', 'H' or 'D'")


def instantiate(
    tid: int, *, qtype: str = "H", n_labels: int = 20, seed: int = 0
) -> Pattern:
    """Materialize template ``tid`` as a C/H/D query with random labels.

    Deterministic in ``seed``. Labels are drawn from ``L0..L{n-1}``
    (the generators' label alphabet), biased toward frequent labels so
    queries have non-trivial match sets on zipf-labeled graphs.
    """
    if qtype not in ("C", "H", "D"):
        raise ValueError(f"bad query type {qtype!r}; use 'C', 'H' or 'D'")
    cls, edges = _T[tid]
    # NB: a stable per-type salt, not hash() — Python string hashing is
    # randomized per process and would make workloads irreproducible.
    rnd = random.Random((tid * 1000003) ^ (seed * 97) ^ {"C": 11, "H": 22, "D": 33}[qtype])
    n_nodes = max(max(e) for e in edges) + 1
    # Favour the frequent half of the alphabet 2:1 so inverted lists
    # are rarely empty at test scale.
    half = max(1, n_labels // 2)
    labels = {
        q: f"L{rnd.randrange(half) if rnd.random() < 0.67 else rnd.randrange(n_labels)}"
        for q in range(n_nodes)
    }
    kinds = _edge_kinds(len(edges), qtype, rnd)
    return Pattern.of(
        labels,
        [PEdge(s, d, k) for (s, d), k in zip(edges, kinds)],
        name=f"{qtype}Q{tid}",
    )


def random_pattern(
    *, n_nodes: int, qtype: str = "D", n_labels: int = 20, seed: int = 0,
    extra_edge_ratio: float = 0.35,
) -> Pattern:
    """Random connected DAG pattern (biology-style workloads, 4..32 nodes).

    A random spanning tree guarantees connectivity; extra forward edges
    (w.r.t. a random topological order, so the pattern stays a DAG) add
    density. Used for the paper's Table 3 large-D-query experiment.
    """
    rnd = random.Random(seed * 131 + n_nodes)
    order = list(range(n_nodes))
    rnd.shuffle(order)
    pos = {q: i for i, q in enumerate(order)}
    edges: set[tuple[int, int]] = set()
    for q in order[1:]:
        parent = rnd.choice([p for p in order if pos[p] < pos[q]])
        edges.add((parent, q))
    n_extra = int(extra_edge_ratio * n_nodes)
    attempts = 0
    while len(edges) < n_nodes - 1 + n_extra and attempts < 200:
        attempts += 1
        a, b = rnd.sample(range(n_nodes), 2)
        if pos[a] > pos[b]:
            a, b = b, a
        edges.add((a, b))
    half = max(1, n_labels // 2)
    labels = {
        q: f"L{rnd.randrange(half) if rnd.random() < 0.67 else rnd.randrange(n_labels)}"
        for q in range(n_nodes)
    }
    kinds = _edge_kinds(len(edges), qtype, rnd)
    return Pattern.of(
        labels,
        [PEdge(s, d, k) for (s, d), k in zip(sorted(edges), kinds)],
        name=f"{qtype}R{n_nodes}",
    )
