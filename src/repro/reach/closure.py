"""Node-reachability substrate: semi-naive transitive closure.

The paper checks ``u ≺ v`` (Def. 2.2) through a reachability index
(BFL [50]). Our dataflow equivalent materializes the reachability
relation ``reach(src, dst)`` once per data graph with a semi-naive
fixpoint of DataFrame joins — the standard distributed-datalog
evaluation of ``reach(x,y) :- edge(x,y)`` / ``reach(x,z) :- reach(x,y),
edge(y,z)``. It handles cyclic graphs (the frontier anti-joins against
the accumulated closure, so it terminates), and at our scaled graph
sizes the closure is small enough to keep cached.

``reach`` contains pairs connected by a path of >= 1 edges, matching
the semantics the DuckDB oracle derives independently with a recursive
CTE (see repro.queries.sql).
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F


def transitive_closure(edges: DataFrame, *, max_iter: int = 256) -> DataFrame:
    """Materialize ``reach(src,dst)``: all >=1-edge paths in ``edges``.

    Semi-naive frontier iteration: each round extends only the newest
    pairs by one edge and anti-joins against the accumulated closure,
    so per-round join size is bounded by |frontier| x avg-degree.
    (Path doubling — reach∘reach — looks asymptotically better but its
    self-join explodes toward V^3 pre-dedup rows once hub nodes have
    large closures; with the generators' O(log n)-depth backbones the
    diameter, and hence the round count, stays small.) Round count =
    graph diameter; ``localCheckpoint`` keeps plans bounded.
    """
    edges = edges.select("src", "dst").distinct().localCheckpoint(eager=True)
    reach = edges
    frontier = edges
    for _ in range(max_iter):
        grown = (
            frontier.alias("f")
            .join(edges.alias("e"), F.col("f.dst") == F.col("e.src"))
            .select(F.col("f.src").alias("src"), F.col("e.dst").alias("dst"))
            .distinct()
            .join(reach, ["src", "dst"], "left_anti")
            .localCheckpoint(eager=True)
        )
        if grown.isEmpty():
            break
        reach = reach.unionByName(grown).localCheckpoint(eager=True)
        frontier = grown
    else:  # pragma: no cover - max_iter far exceeds any test diameter
        raise RuntimeError(f"transitive closure did not converge in {max_iter} rounds")
    return reach
