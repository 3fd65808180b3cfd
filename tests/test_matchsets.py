"""Tests for match sets (§4.1) against pandas-side recomputation."""
import pytest

from repro.queries.pattern import CHILD, DESC, Pattern, PEdge
from tests.bruteforce import reach_pairs


@pytest.fixture(scope="module")
def bundle(tiny_ctx_for):
    g, ctx = tiny_ctx_for(0)
    nodes, edges = g.to_pandas()
    labs = sorted(nodes.label.unique())
    p = Pattern.of({0: labs[0], 1: labs[1]}, [(0, 1, CHILD)])
    pd_ = Pattern.of({0: labs[0], 1: labs[1]}, [(0, 1, DESC)])
    return g, ctx, nodes, edges, p, pd_


def test_ms_node_is_inverted_list(bundle):
    g, ctx, nodes, _, p, _ = bundle
    got = {r["id"] for r in ctx.ms_node(p, 0).collect()}
    assert got == set(nodes[nodes.label == p.label_of(0)].id)


def test_ms_child_edge(bundle):
    g, ctx, nodes, edges, p, _ = bundle
    lab = dict(zip(nodes.id, nodes.label))
    expected = {
        (s, d)
        for s, d in edges.itertuples(index=False)
        if lab[s] == p.label_of(0) and lab[d] == p.label_of(1)
    }
    got = {(r["src"], r["dst"]) for r in ctx.ms_edge(p, p.edges[0]).collect()}
    assert got == expected


def test_ms_desc_edge(bundle):
    g, ctx, nodes, edges, _, pd_ = bundle
    lab = dict(zip(nodes.id, nodes.label))
    rp = reach_pairs(edges)
    expected = {
        (s, d) for (s, d) in rp
        if lab[s] == pd_.label_of(0) and lab[d] == pd_.label_of(1)
    }
    got = {(r["src"], r["dst"]) for r in ctx.ms_edge(pd_, pd_.edges[0]).collect()}
    assert got == expected


def test_ms_edge_cached_by_kind_and_labels(bundle):
    _, ctx, _, _, p, _ = bundle
    a = ctx.ms_edge(p, p.edges[0])
    b = ctx.ms_edge(p, p.edges[0])
    assert a is b


def test_child_subset_of_desc(bundle):
    _, ctx, _, _, p, pd_ = bundle
    child = {(r["src"], r["dst"]) for r in ctx.ms_edge(p, p.edges[0]).collect()}
    desc = {(r["src"], r["dst"]) for r in ctx.ms_edge(pd_, pd_.edges[0]).collect()}
    assert child <= desc


def test_release_clears_cache(bundle):
    _, ctx, _, _, p, _ = bundle
    ctx.ms_edge(p, p.edges[0])
    ctx.release()
    assert ctx._edge_ms == {}
