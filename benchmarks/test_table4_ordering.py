"""Bench target for paper Table 4: GM-RI / GM-JO / GM-BJ orderings."""
from benchmarks._scale import SCALE
from repro.harness.tables import table4


def test_table4_ordering(run_table, spark):
    t = run_table(table4, spark, scale=SCALE)
    assert len(t.rows) == 10  # 5 templates x 2 datasets
    # Shape (paper): JO is the best strategy on aggregate.
    tot = {m: sum(float(r[i]) for r in t.rows) for i, m in ((2, "ri"), (3, "jo"), (4, "bj"))}
    assert tot["jo"] <= tot["ri"] * 1.1
