"""Bench target for paper Table 6: Neo4j vs GM on H-queries."""
from benchmarks._scale import SCALE
from repro.harness.tables import table6


def _num(x):
    try:
        return float(x)
    except ValueError:
        return float("inf")


def test_table6_neo4j_h(run_table, spark):
    t = run_table(table6, spark, scale=SCALE)
    # Shape (paper): GM is faster than Neo4j on every H-query and never
    # fails.
    assert all(_num(r[2]) < float("inf") for r in t.rows)
    gm_tot = sum(_num(r[2]) for r in t.rows)
    neo_tot = sum(_num(r[1]) for r in t.rows)
    assert gm_tot <= neo_tot
