"""Tests for the Fig.-7-style template workloads (driver-side)."""
import pytest

from repro.queries.pattern import CHILD, DESC
from repro.queries.templates import (
    CLASSES,
    TEMPLATE_IDS,
    instantiate,
    random_pattern,
    template_class,
    templates_by_class,
)


def test_twenty_templates():
    assert len(TEMPLATE_IDS) == 20
    assert TEMPLATE_IDS == list(range(20))


def test_every_class_nonempty():
    for cls in CLASSES:
        assert templates_by_class(cls), cls


def test_class_partition():
    all_ids = [tid for cls in CLASSES for tid in templates_by_class(cls)]
    assert sorted(all_ids) == TEMPLATE_IDS


@pytest.mark.parametrize("tid", TEMPLATE_IDS)
def test_instantiate_valid_and_connected(tid):
    p = instantiate(tid, qtype="H", n_labels=20, seed=3)
    p.validate()
    assert p.is_connected()
    assert p.n_nodes() >= 3


@pytest.mark.parametrize("tid", TEMPLATE_IDS)
def test_c_queries_child_only(tid):
    p = instantiate(tid, qtype="C")
    assert all(e.kind == CHILD for e in p.edges)


@pytest.mark.parametrize("tid", TEMPLATE_IDS)
def test_d_queries_desc_only(tid):
    p = instantiate(tid, qtype="D")
    assert all(e.kind == DESC for e in p.edges)


@pytest.mark.parametrize("tid", TEMPLATE_IDS)
def test_h_queries_are_hybrid(tid):
    p = instantiate(tid, qtype="H")
    kinds = {e.kind for e in p.edges}
    # ~50% split; any template with >=2 edges must carry both kinds.
    assert kinds == {CHILD, DESC}


def test_instantiate_deterministic():
    a = instantiate(6, qtype="H", seed=5)
    b = instantiate(6, qtype="H", seed=5)
    assert a == b


def test_instantiate_seed_sensitivity():
    a = instantiate(6, qtype="H", seed=5)
    b = instantiate(6, qtype="H", seed=6)
    assert a.labels != b.labels or a.edges != b.edges


def test_bad_qtype_rejected():
    with pytest.raises(ValueError):
        instantiate(0, qtype="X")


def test_clique_templates_are_complete():
    for tid, k in ((11, 4), (12, 5), (19, 7)):
        p = instantiate(tid, qtype="C")
        assert p.n_nodes() == k
        assert len(p.edges) == k * (k - 1) // 2


def test_combo_templates_have_many_cycles():
    # combo = undirected graph with > 2 independent cycles:
    # |E| - |V| + 1 > 2 for a connected graph.
    for tid in templates_by_class("combo"):
        p = instantiate(tid, qtype="C")
        assert len(p.edges) - p.n_nodes() + 1 > 2, tid


def test_acyclic_templates_are_trees_or_dags():
    for tid in templates_by_class("acyclic"):
        p = instantiate(tid, qtype="C")
        assert len(p.edges) == p.n_nodes() - 1  # undirected-acyclic


@pytest.mark.parametrize("n", [4, 8, 12, 20, 32])
def test_random_pattern_connected_dag(n):
    p = random_pattern(n_nodes=n, qtype="D", seed=1)
    p.validate()
    assert p.n_nodes() == n
    assert p.is_dag()


def test_random_pattern_deterministic():
    assert random_pattern(n_nodes=8, seed=2) == random_pattern(n_nodes=8, seed=2)


def test_random_pattern_type_variants():
    c = random_pattern(n_nodes=6, qtype="C", seed=3)
    d = random_pattern(n_nodes=6, qtype="D", seed=3)
    assert all(e.kind == CHILD for e in c.edges)
    assert all(e.kind == DESC for e in d.edges)
