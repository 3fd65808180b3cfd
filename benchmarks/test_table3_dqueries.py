"""Bench target for paper Table 3: JM/TM/GM on large D-queries."""
from benchmarks._scale import SCALE
from repro.harness.tables import table3


def test_table3_dqueries(run_table, spark):
    t = run_table(table3, spark, scale=SCALE)
    gm_rows = [r for r in t.rows if r[1] == "GM"]
    jm_rows = [r for r in t.rows if r[1] == "JM"]
    # Shape (paper): GM solves every query on every dataset; JM fails
    # (TO/OM) on the large queries.
    n_queries = gm_rows[0][4] + gm_rows[0][2] + gm_rows[0][3]
    assert all(r[4] == n_queries for r in gm_rows), t.rows
    assert all(r[4] < n_queries for r in jm_rows), t.rows
