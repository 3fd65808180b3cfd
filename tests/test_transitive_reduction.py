"""Tests for pattern transitive reduction (paper §3, driver-side)."""
from repro.queries.pattern import CHILD, DESC, Pattern, PEdge
from repro.queries.templates import instantiate
from repro.queries.transitive_reduction import transitive_reduction


def P(labels, edges):
    return Pattern.of(labels, edges)


def test_paper_fig3_example():
    # Q: A->B, B->C (children), A=>C reachability: (A,C) is transitive.
    p = P({0: "A", 1: "B", 2: "C"}, [(0, 1, CHILD), (1, 2, CHILD), (0, 2, DESC)])
    r = transitive_reduction(p)
    assert PEdge(0, 2, DESC) not in r.edges
    assert len(r.edges) == 2


def test_child_edges_never_removed():
    # A->C child edge alongside A->B->C: adjacency is not derivable.
    p = P({0: "A", 1: "B", 2: "C"}, [(0, 1, CHILD), (1, 2, CHILD), (0, 2, CHILD)])
    r = transitive_reduction(p)
    assert len(r.edges) == 3


def test_desc_path_justifies_removal():
    p = P({0: "A", 1: "B", 2: "C"}, [(0, 1, DESC), (1, 2, DESC), (0, 2, DESC)])
    r = transitive_reduction(p)
    assert len(r.edges) == 2
    assert PEdge(0, 2, DESC) not in r.edges


def test_no_mutual_elimination():
    # Two parallel desc paths 0=>1=>3 and 0=>2=>3 plus shortcut 0=>3:
    # only the shortcut is transitive; the paths justify each other's
    # survival and must not be cannibalized.
    p = P(
        {0: "A", 1: "B", 2: "C", 3: "D"},
        [(0, 1, DESC), (1, 3, DESC), (0, 2, DESC), (2, 3, DESC), (0, 3, DESC)],
    )
    r = transitive_reduction(p)
    assert len(r.edges) == 4
    assert PEdge(0, 3, DESC) not in r.edges


def test_idempotent():
    p = instantiate(15, qtype="D", seed=4)
    once = transitive_reduction(p)
    twice = transitive_reduction(once)
    assert set(once.edges) == set(twice.edges)


def test_reduction_is_subset_with_same_nodes():
    for tid in (10, 13, 15, 16, 18):
        p = instantiate(tid, qtype="D", seed=1)
        r = transitive_reduction(p)
        assert set(r.edges) <= set(p.edges)
        assert r.labels == p.labels
        assert r.is_connected()


def test_irreducible_pattern_untouched():
    p = P({0: "A", 1: "B", 2: "C"}, [(0, 1, DESC), (0, 2, DESC)])
    assert set(transitive_reduction(p).edges) == set(p.edges)


def test_preserves_reachability_closure():
    # Every removed edge's endpoints stay connected by a directed path.
    for tid in (15, 16, 18):
        p = instantiate(tid, qtype="D", seed=2)
        r = transitive_reduction(p)
        for e in set(p.edges) - set(r.edges):
            assert r.has_path(e.src, e.dst)
