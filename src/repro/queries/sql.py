"""Compile a pattern query to SQL for the DuckDB oracle.

The query answer (Def. 2.6) is a relation over the pattern's nodes: one
column ``q{i}`` per pattern node, one row per homomorphism. The oracle
SQL joins ``nodes`` once per pattern node, ``edges`` for child edges,
and a reachability relation for descendant edges. Reachability is
derived *inside DuckDB* with a recursive CTE, independently of our
Spark transitive closure — so the oracle also catches a broken closure.

Used with :func:`repro.oracle.assert_equivalent` as::

    assert_equivalent(result_df, pattern_to_sql(p), nodes=nodes_pdf, edges=edges_pdf)
"""
from __future__ import annotations

from repro.queries.pattern import CHILD, Pattern

_REACH_CTE = (
    "WITH RECURSIVE r(src, dst) AS (\n"
    "  SELECT src, dst FROM edges\n"
    "  UNION\n"
    "  SELECT r.src, e.dst FROM r JOIN edges e ON r.dst = e.src\n"
    ")\n"
)


def col_name(q: int) -> str:
    """Output column for pattern node ``q`` — shared with GM/JM/TM."""
    return f"q{q}"


def pattern_to_sql(p: Pattern) -> str:
    """SQL whose result is exactly ``Q(G)`` over tables nodes/edges."""
    needs_reach = any(e.kind != CHILD for e in p.edges)
    froms = [f"nodes n{q}" for q in p.node_ids()]
    wheres = [f"n{q}.label = '{p.label_of(q)}'" for q in p.node_ids()]
    for i, e in enumerate(p.edges):
        rel = "edges" if e.kind == CHILD else "r"
        froms.append(f"{rel} e{i}")
        wheres.append(f"e{i}.src = n{e.src}.id")
        wheres.append(f"e{i}.dst = n{e.dst}.id")
    select = ", ".join(f"n{q}.id AS {col_name(q)}" for q in p.node_ids())
    sql = (
        f"SELECT {select}\nFROM {', '.join(froms)}\nWHERE "
        + "\n  AND ".join(wheres)
    )
    return (_REACH_CTE + sql) if needs_reach else sql


def count_sql(p: Pattern) -> str:
    """SQL counting |Q(G)| (used when full enumeration is too large)."""
    return f"SELECT count(*) AS n FROM ({pattern_to_sql(p)}) t"
