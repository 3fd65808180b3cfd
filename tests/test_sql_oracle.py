"""Tests for the pattern->SQL compiler against the brute-force matcher.

These validate the *oracle itself*: the DuckDB SQL produced by
pattern_to_sql must agree with an independent backtracking matcher on
tiny graphs, so downstream oracle comparisons are trustworthy.
"""
import duckdb
import pytest

from repro.queries.pattern import CHILD, DESC, Pattern
from repro.queries.sql import col_name, count_sql, pattern_to_sql
from repro.queries.templates import instantiate
from tests.bruteforce import homomorphisms


def _duck(sql, nodes, edges):
    con = duckdb.connect()
    try:
        con.register("nodes", nodes)
        con.register("edges", edges)
        return con.execute(sql).fetchdf()
    finally:
        con.close()


def test_col_name():
    assert col_name(3) == "q3"


def test_child_only_sql_has_no_cte():
    p = instantiate(0, qtype="C")
    assert "RECURSIVE" not in pattern_to_sql(p)


def test_desc_sql_has_cte():
    p = instantiate(0, qtype="D")
    assert "WITH RECURSIVE" in pattern_to_sql(p)


@pytest.mark.parametrize("tid,qtype", [(1, "C"), (1, "D"), (6, "H"), (8, "H"), (9, "D")])
def test_sql_matches_bruteforce(tiny_ctx_for, tid, qtype):
    g, _ = tiny_ctx_for(0)
    nodes, edges = g.to_pandas()
    p = instantiate(tid, qtype=qtype, n_labels=5, seed=1)
    got = _duck(pattern_to_sql(p), nodes, edges)
    expected = homomorphisms(p, nodes, edges)
    got_set = {tuple(int(row[col_name(q)]) for q in p.node_ids()) for _, row in got.iterrows()}
    assert got_set == expected
    assert len(got) == len(expected)  # set semantics: no duplicate rows


def test_handmade_pattern_sql(tiny_ctx_for):
    g, _ = tiny_ctx_for(3)
    nodes, edges = g.to_pandas()
    lab = sorted(nodes.label.unique())
    p = Pattern.of(
        {0: lab[0], 1: lab[1 % len(lab)]},
        [(0, 1, DESC)],
    )
    got = _duck(pattern_to_sql(p), nodes, edges)
    expected = homomorphisms(p, nodes, edges)
    assert len(got) == len(expected)


def test_count_sql(tiny_ctx_for):
    g, _ = tiny_ctx_for(0)
    nodes, edges = g.to_pandas()
    p = instantiate(1, qtype="C", n_labels=5, seed=1)
    n = _duck(count_sql(p), nodes, edges)["n"].iloc[0]
    assert n == len(homomorphisms(p, nodes, edges))


def test_same_label_nodes_allowed(tiny_ctx_for):
    # Homomorphisms may map two query nodes to the same data node.
    g, _ = tiny_ctx_for(0)
    nodes, edges = g.to_pandas()
    lab = nodes.label.iloc[0]
    p = Pattern.of({0: lab, 1: lab, 2: lab}, [(0, 1, DESC), (1, 2, DESC)])
    got = _duck(pattern_to_sql(p), nodes, edges)
    expected = homomorphisms(p, nodes, edges)
    assert len(got) == len(expected)
