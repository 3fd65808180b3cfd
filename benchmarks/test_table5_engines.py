"""Bench target for paper Table 5: EH / Neo4j / GM on C-queries."""
from benchmarks._scale import SCALE
from repro.harness.tables import table5


def _num(x):
    try:
        return float(x)
    except ValueError:
        return float("inf")  # TO/OM


def test_table5_engines(run_table, spark):
    t = run_table(table5, spark, scale=SCALE)
    # Shape (paper): GM beats full EH (probe+precompute) and Neo4j on
    # aggregate, and never fails.
    gm_tot = sum(_num(r[5]) for r in t.rows)
    assert gm_tot < float("inf")
    assert gm_tot <= sum(_num(r[3]) for r in t.rows)  # vs EH
    assert gm_tot <= sum(_num(r[4]) for r in t.rows)  # vs Neo4j
