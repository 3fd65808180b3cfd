"""Tests for the JM / TM baselines and node pre-filtering."""
import pytest

from repro.baselines.jm import edge_relations, jm, plan_left_deep
from repro.baselines.prefilter import prefilter_nodes
from repro.baselines.tm import spanning_tree, tm
from repro.core.gm import gm
from repro.core.simulation import fb_sim
from repro.harness.runner import run_guarded
from repro.queries.templates import instantiate
from tests.bruteforce import homomorphisms


GRID = [(1, "C"), (6, "H"), (9, "D"), (8, "H"), (11, "C")]


@pytest.mark.parametrize("tid,qtype", GRID)
def test_jm_matches_bruteforce(tiny_ctx_for, tid, qtype):
    g, ctx = tiny_ctx_for(0)
    nodes, edges = g.to_pandas()
    p = instantiate(tid, qtype=qtype, n_labels=5, seed=1)
    got = {tuple(r) for r in jm(ctx, p).collect()}
    assert got == homomorphisms(p, nodes, edges)


@pytest.mark.parametrize("tid,qtype", GRID)
def test_tm_matches_bruteforce(tiny_ctx_for, tid, qtype):
    g, ctx = tiny_ctx_for(0)
    nodes, edges = g.to_pandas()
    p = instantiate(tid, qtype=qtype, n_labels=5, seed=1)
    got = {tuple(r) for r in tm(ctx, p).collect()}
    assert got == homomorphisms(p, nodes, edges)


def test_three_algorithms_agree_on_dataset(ctx_for):
    g, ctx = ctx_for("em")
    p = instantiate(6, qtype="H", n_labels=20, seed=2)
    a = {tuple(r) for r in gm(ctx, p).df.collect()}
    b = {tuple(r) for r in jm(ctx, p).collect()}
    c = {tuple(r) for r in tm(ctx, p).collect()}
    assert a == b == c


class TestPrefilter:
    def test_superset_of_double_simulation(self, tiny_ctx_for):
        # One-pass pre-filtering prunes less than the FB fixpoint (§4.2).
        g, ctx = tiny_ctx_for(1)
        p = instantiate(6, qtype="H", n_labels=5, seed=1)
        pf = prefilter_nodes(ctx, p)
        sim = fb_sim(ctx, p, max_passes=None)
        for q in p.node_ids():
            pf_set = {r["id"] for r in pf[q].collect()}
            fb_set = {r["id"] for r in sim.fb[q].collect()}
            assert fb_set <= pf_set

    def test_subset_of_match_sets(self, tiny_ctx_for):
        g, ctx = tiny_ctx_for(1)
        p = instantiate(6, qtype="H", n_labels=5, seed=1)
        pf = prefilter_nodes(ctx, p)
        for q in p.node_ids():
            ms = {r["id"] for r in ctx.ms_node(p, q).collect()}
            assert {r["id"] for r in pf[q].collect()} <= ms


class TestSpanningTree:
    def test_covers_all_nodes(self):
        p = instantiate(13, qtype="H", n_labels=5, seed=0)
        tree, non_tree = spanning_tree(p)
        assert len(tree) == p.n_nodes() - 1
        assert set(tree) | set(non_tree) == set(p.edges)

    def test_tree_edges_disjoint_from_non_tree(self):
        p = instantiate(16, qtype="C", n_labels=5, seed=0)
        tree, non_tree = spanning_tree(p)
        assert not set(tree) & set(non_tree)

    def test_tree_pattern_has_no_non_tree_edges(self):
        p = instantiate(2, qtype="C", n_labels=5, seed=0)  # tree template
        tree, non_tree = spanning_tree(p)
        assert non_tree == []


class TestPlanning:
    def test_plan_covers_all_edges(self, tiny_ctx_for):
        g, ctx = tiny_ctx_for(0)
        p = instantiate(8, qtype="H", n_labels=5, seed=1)
        rels = edge_relations(ctx, p)
        card = {e: rels[e].count() for e in p.edges}
        node_card = {q: ctx.ms_node(p, q).count() for q in p.node_ids()}
        plan = plan_left_deep(p, card, node_card)
        assert set(plan) == set(p.edges)

    def test_plan_prefix_connected(self, tiny_ctx_for):
        g, ctx = tiny_ctx_for(0)
        p = instantiate(13, qtype="C", n_labels=5, seed=1)
        card = {e: 10 for e in p.edges}
        node_card = {q: 10 for q in p.node_ids()}
        plan = plan_left_deep(p, card, node_card)
        bound = {plan[0].src, plan[0].dst}
        for e in plan[1:]:
            assert e.src in bound or e.dst in bound
            bound |= {e.src, e.dst}


class TestGuards:
    def test_jm_row_cap_gives_om(self, ctx_for):
        g, ctx = ctx_for("em")
        p = instantiate(9, qtype="D", n_labels=20, seed=2)
        r = run_guarded(lambda gd: jm(ctx, p, guard=gd).count(), row_cap=1)
        assert r.status == "OM"

    def test_tm_time_limit_gives_to(self, ctx_for):
        g, ctx = ctx_for("em")
        p = instantiate(6, qtype="H", n_labels=20, seed=2)
        r = run_guarded(lambda gd: tm(ctx, p, guard=gd).count(), time_limit_s=1e-4)
        assert r.status == "TO"
