"""Bench target for paper Table 2: dataset statistics."""
from benchmarks._scale import SCALE
from repro.graphs.datasets import PAPER_STATS
from repro.harness.tables import table2


def test_table2_datasets(run_table, spark):
    t = run_table(table2, spark, scale=SCALE)
    assert len(t.rows) == len(PAPER_STATS)
    by_name = {r[0]: r for r in t.rows}
    # Shape: label alphabets match the paper's ordering (am smallest,
    # hp largest) and hu is the densest graph — the properties that
    # drive the paper's results.
    assert by_name["am"][3] <= by_name["bs"][3] < by_name["em"][3] <= by_name["hp"][3]
    assert by_name["hu"][4] == max(r[4] for r in t.rows)
