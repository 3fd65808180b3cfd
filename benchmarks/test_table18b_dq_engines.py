"""Bench target for paper Fig 18(b): D-queries vs #labels per engine."""
from repro.harness.tables import table18b


def _num(x):
    try:
        return float(x)
    except ValueError:
        return float("inf")


def test_table18b_dq_engines(run_table, spark):
    t = run_table(table18b, spark)
    # Shape (paper): GM beats Neo4j everywhere; more labels -> faster GM.
    gm = [r for r in t.rows if r[1] == "GM"]
    neo = [r for r in t.rows if r[1] == "Neo4j"]
    for g_row, n_row in zip(gm, neo):
        assert sum(_num(x) for x in g_row[2:]) <= sum(_num(x) for x in n_row[2:])
    for r in gm:
        assert _num(r[-1]) <= _num(r[2]) * 1.5  # 20 labels no slower than 5
