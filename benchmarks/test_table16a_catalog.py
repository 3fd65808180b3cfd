"""Bench target for paper Fig 16(a): GF catalog build per dataset."""
from benchmarks._scale import SCALE
from repro.harness.tables import table16a


def test_table16a_catalog(run_table, spark):
    t = run_table(table16a, spark, scale=SCALE)
    status = {r[0]: r[1] for r in t.rows}
    # Shape (paper): catalog OOMs on em/ep/hp; small-alphabet web/product
    # graphs (am/bs/go) build fine.
    assert status["em"] == status["ep"] == status["hp"] == "OM"
    for ds in ("am", "bs", "go", "yt", "hu"):
        assert status[ds] != "OM", t.rows
