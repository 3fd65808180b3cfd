"""Tests for the reachability substrate: transitive closure + BFL index."""
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.reach.bfl import build_bfl
from repro.reach.closure import transitive_closure
from tests.bruteforce import reach_pairs


def _mk_edges(spark, pairs):
    return spark.createDataFrame(pd.DataFrame(pairs, columns=["src", "dst"]), "src LONG, dst LONG")


def _closure_set(df):
    return {(r["src"], r["dst"]) for r in df.collect()}


class TestTransitiveClosure:
    def test_path(self, spark):
        tc = transitive_closure(_mk_edges(spark, [(0, 1), (1, 2), (2, 3)]))
        assert _closure_set(tc) == {
            (0, 1), (0, 2), (0, 3), (1, 2), (1, 3), (2, 3)
        }

    def test_cycle_includes_self_reach(self, spark):
        tc = transitive_closure(_mk_edges(spark, [(0, 1), (1, 2), (2, 0)]))
        got = _closure_set(tc)
        assert (0, 0) in got and (1, 1) in got and (2, 2) in got
        assert len(got) == 9

    def test_diamond(self, spark):
        tc = transitive_closure(_mk_edges(spark, [(0, 1), (0, 2), (1, 3), (2, 3)]))
        got = _closure_set(tc)
        assert (0, 3) in got and (1, 2) not in got

    def test_duplicate_input_edges_ok(self, spark):
        tc = transitive_closure(_mk_edges(spark, [(0, 1), (0, 1), (1, 2)]))
        assert _closure_set(tc) == {(0, 1), (1, 2), (0, 2)}

    @pytest.mark.parametrize("seed", [0, 1, 2])
    def test_matches_bruteforce_on_random_graphs(self, tiny_ctx_for, seed):
        g, ctx = tiny_ctx_for(seed)
        expected = reach_pairs(g.edges.toPandas())
        assert _closure_set(ctx.reach) == expected

    def test_matches_duckdb_recursive_cte(self, tiny_ctx_for):
        import duckdb

        g, ctx = tiny_ctx_for(1)
        con = duckdb.connect()
        con.register("edges", g.edges.toPandas())
        expected = {
            tuple(r)
            for r in con.execute(
                "WITH RECURSIVE r(src,dst) AS ("
                " SELECT src,dst FROM edges UNION"
                " SELECT r.src, e.dst FROM r JOIN edges e ON r.dst=e.src)"
                " SELECT src,dst FROM r"
            ).fetchall()
        }
        con.close()
        assert _closure_set(ctx.reach) == expected


class TestBFL:
    @pytest.fixture(scope="class")
    def bundle(self, tiny_ctx_for):
        g, ctx = tiny_ctx_for(2)
        return g, ctx, build_bfl(g.nodes, g.edges)

    def test_labels_cover_all_nodes(self, bundle):
        g, _, idx = bundle
        assert idx.labels.count() == g.nodes.count()
        assert set(idx.labels.columns) == {"id", "bloom_out", "bloom_in"}

    def test_no_false_negatives(self, bundle):
        # Every truly reachable pair must survive the Bloom filter.
        g, ctx, idx = bundle
        survived = idx.filter_pairs(ctx.reach)
        missing = ctx.reach.join(survived, ["src", "dst"], "left_anti").count()
        assert missing == 0

    def test_filters_some_negatives(self, bundle):
        # On all candidate pairs, the filter should reject a decent
        # share of the non-reachable ones (it is only probabilistic,
        # but 64-bit blooms on a 40-node graph are effective).
        g, ctx, idx = bundle
        ids = g.nodes.select(F.col("id").alias("src"))
        all_pairs = ids.crossJoin(g.nodes.select(F.col("id").alias("dst")))
        non_reach = all_pairs.join(ctx.reach, ["src", "dst"], "left_anti")
        n_non = non_reach.count()
        n_pass = idx.filter_pairs(non_reach).count()
        assert n_pass < n_non  # strictly prunes something

    def test_own_bit_set(self, bundle):
        _, _, idx = bundle
        zero = idx.labels.where(
            (F.col("bloom_out") == 0) | (F.col("bloom_in") == 0)
        ).count()
        assert zero == 0
