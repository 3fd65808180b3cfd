"""Pattern transitive reduction (paper §3).

A reachability edge ``e=(x,y)`` is *transitive* — hence redundant —
when the pattern contains another simple directed path from ``x`` to
``y`` (any mix of child/descendant edges implies ``x ≺ y``). Removing
transitive edges yields an equivalent query with fewer edge-to-path
matches to compute; the paper's Fig. 15 experiment shows this rewrite
is worth ~1.4-12x.

For acyclic patterns the reduction is unique; for cyclic ones we return
one valid reduction (edges scanned in deterministic order), matching
Def. 3.1's "a transitive reduction".
"""
from __future__ import annotations

from repro.queries.pattern import DESC, Pattern


def transitive_reduction(p: Pattern) -> Pattern:
    """Drop reachability edges derivable from some other directed path.

    Child edges are never dropped (they constrain adjacency, which a
    longer path cannot express). Removal is iterative against the
    *current* edge set, so two descendant edges cannot justify deleting
    each other — once an edge is removed, later checks no longer see it.
    """
    edges = list(p.edges)
    changed = True
    while changed:
        changed = False
        for e in list(edges):
            if e.kind != DESC:
                continue
            trial = p.with_edges([x for x in edges if x != e])
            if trial.has_path(e.src, e.dst):
                edges.remove(e)
                changed = True
    out = p.with_edges(edges, name=p.name)
    out.validate()
    return out
