"""Synthetic data-graph generators.

The paper evaluates on nine real SNAP/bio graphs (its Table 2). Those
exact graphs are not available offline, so we generate *profile-matched*
synthetic substitutes: same label-alphabet size, similar average degree,
and the right degree-skew family (power-law out-degree for social/web
graphs, near-uniform for the email/communication graph), scaled down so
a laptop-scale Spark session can run the whole evaluation. DESIGN.md
documents this substitution; EXPERIMENTS.md compares *shapes*, not
absolute runtimes.

Generation is deterministic in ``seed`` (numpy Generator), so the
DuckDB oracle and Spark see identical graphs.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np
import pandas as pd
from pyspark.sql import SparkSession

from repro.graphs.model import Graph, graph_from_pandas


@dataclass(frozen=True)
class GraphProfile:
    """Shape parameters of a synthetic data graph.

    ``avg_out_degree`` is |E|/|V|. ``degree_skew`` selects the
    out-degree law: ``powerlaw`` draws zipfian out-degrees and zipfian
    destination popularity (social/web-like hubs), ``uniform`` draws
    near-constant out-degrees and uniform destinations (email-like).
    ``label_skew`` > 0 makes label frequencies zipfian (real graphs'
    inverted lists are uneven), 0 gives uniform labels.
    """

    n_labels: int
    avg_out_degree: float
    degree_skew: str = "powerlaw"  # 'powerlaw' | 'uniform'
    label_skew: float = 0.6


def _zipf_weights(n: int, alpha: float) -> np.ndarray:
    w = 1.0 / np.arange(1, n + 1) ** alpha
    return w / w.sum()


def generate_graph(
    spark: SparkSession,
    *,
    n_nodes: int,
    profile: GraphProfile,
    seed: int = 0,
    name: str = "graph",
) -> Graph:
    """Generate a connected-ish directed labeled graph for ``profile``.

    A random-recursive-tree backbone over a random node permutation
    guarantees weak connectivity (Def. 2.1 assumes connected graphs)
    with O(log n) depth, so the graph's reachability relation stays
    sparse and realistic (a path backbone would make the transitive
    closure quadratic); the remaining edges are drawn per the profile's
    degree law. Self-loops are dropped and edges deduplicated.
    """
    g = np.random.default_rng(seed)
    ids = np.arange(n_nodes, dtype=np.int64)

    if profile.label_skew > 0:
        label_idx = g.choice(
            profile.n_labels, n_nodes, p=_zipf_weights(profile.n_labels, profile.label_skew)
        )
    else:
        label_idx = g.integers(0, profile.n_labels, n_nodes)
    nodes = pd.DataFrame({"id": ids, "label": [f"L{i}" for i in label_idx]})

    n_edges = max(n_nodes, int(round(profile.avg_out_degree * n_nodes)))
    # Backbone for weak connectivity: each node (in random order) gets
    # one edge from a uniformly chosen earlier node — a random
    # recursive tree, expected depth O(log n).
    perm = g.permutation(ids)
    parent_pos = (g.random(n_nodes - 1) * np.arange(1, n_nodes)).astype(np.int64)
    bb_src, bb_dst = perm[parent_pos], perm[1:]

    n_rand = max(0, n_edges - len(bb_src))
    if profile.degree_skew == "powerlaw":
        # Hubby sources and popular destinations: zipfian over a random
        # relabeling so hubs are not the low ids.
        relabel = g.permutation(ids)
        w = _zipf_weights(n_nodes, 0.8)
        src = relabel[g.choice(n_nodes, n_rand, p=w)]
        dst = relabel[g.choice(n_nodes, n_rand, p=_zipf_weights(n_nodes, 0.6))]
    else:
        src = g.integers(0, n_nodes, n_rand)
        dst = g.integers(0, n_nodes, n_rand)

    edges = pd.DataFrame(
        {
            "src": np.concatenate([bb_src, src]).astype(np.int64),
            "dst": np.concatenate([bb_dst, dst]).astype(np.int64),
        }
    )
    edges = edges[edges.src != edges.dst].drop_duplicates(ignore_index=True)
    return graph_from_pandas(spark, nodes, edges, name=name)
