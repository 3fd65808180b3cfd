"""Registry of the paper's nine datasets as scaled synthetic profiles.

Table 2 of the paper lists |V|, |E|, |L| and average degree for each
dataset. ``PAPER_STATS`` records those published numbers verbatim (used
by the Table-2 harness to print paper-vs-measured rows). ``PROFILES``
gives the shape parameters of our synthetic substitutes, and ``SCALES``
the node counts used at test vs bench scale (~100-1000x smaller than
the originals — see DESIGN.md "Substitutions").

Label alphabets larger than ~40 are scaled down too (HPRD has 307
labels; at a few hundred nodes that would make every inverted list a
near-singleton and trivialize matching), preserving the *relative*
ordering of label-alphabet sizes across datasets, which is what drives
the paper's label-sensitivity results.
"""
from __future__ import annotations

from pyspark.sql import SparkSession

from repro.graphs.generators import GraphProfile, generate_graph
from repro.graphs.model import Graph

# name -> (V, E, L, d_avg) exactly as printed in the paper's Table 2.
PAPER_STATS: dict[str, tuple[int, int, int, float]] = {
    "yt": (3_100, 12_000, 71, 8.05),
    "hu": (4_600, 86_000, 44, 36.9),
    "hp": (9_400, 35_000, 307, 7.4),
    "ep": (76_000, 509_000, 20, 6.87),
    "db": (317_000, 1_049_000, 20, 6.62),
    "em": (265_000, 420_000, 20, 2.6),
    "am": (403_000, 3_500_000, 3, 6.29),
    "bs": (685_000, 7_600_000, 5, 11.76),
    "go": (876_000, 5_100_000, 5, 6.47),
}

PROFILES: dict[str, GraphProfile] = {
    # Biology graphs: modest size, many labels, yeast/hprd sparse,
    # human very dense (paper: d_avg 36.9 is what breaks JM/TM there).
    "yt": GraphProfile(n_labels=24, avg_out_degree=4.0, degree_skew="powerlaw"),
    "hu": GraphProfile(n_labels=20, avg_out_degree=18.0, degree_skew="uniform"),
    "hp": GraphProfile(n_labels=40, avg_out_degree=3.7, degree_skew="powerlaw"),
    # Social / web: power-law, 20 labels.
    "ep": GraphProfile(n_labels=20, avg_out_degree=3.4, degree_skew="powerlaw"),
    "db": GraphProfile(n_labels=20, avg_out_degree=3.3, degree_skew="powerlaw"),
    # Email: near-uniform sparse.
    "em": GraphProfile(n_labels=20, avg_out_degree=1.6, degree_skew="uniform"),
    # Product / web: tiny label alphabets (what makes matching hard).
    "am": GraphProfile(n_labels=3, avg_out_degree=3.1, degree_skew="powerlaw"),
    "bs": GraphProfile(n_labels=5, avg_out_degree=5.9, degree_skew="powerlaw"),
    "go": GraphProfile(n_labels=5, avg_out_degree=3.2, degree_skew="powerlaw"),
}

# Node counts per scale. Tests run on 'test'; benchmarks on 'bench'.
SCALES: dict[str, dict[str, int]] = {
    "test": {
        "yt": 200, "hu": 200, "hp": 240, "ep": 260, "db": 260,
        "em": 260, "am": 220, "bs": 220, "go": 220,
    },
    "bench": {
        "yt": 600, "hu": 600, "hp": 800, "ep": 1200, "db": 1200,
        "em": 1200, "am": 800, "bs": 800, "go": 800,
    },
}


def dataset_names() -> list[str]:
    return list(PAPER_STATS)


def load_dataset(
    spark: SparkSession, name: str, *, scale: str = "test", seed: int = 7
) -> Graph:
    """Generate the scaled synthetic substitute for dataset ``name``."""
    if name not in PROFILES:
        raise KeyError(f"unknown dataset {name!r}; options: {dataset_names()}")
    # Stable per-dataset salt (hash() is randomized per process).
    salt = sum(ord(c) * 31**i for i, c in enumerate(name))
    return generate_graph(
        spark,
        n_nodes=SCALES[scale][name],
        profile=PROFILES[name],
        seed=seed + salt % 1000,
        name=f"{name}-{scale}",
    ).cache()


def load_email_variant(
    spark: SparkSession, *, n_nodes: int, n_labels: int, seed: int = 11
) -> Graph:
    """Email-graph fragment with a chosen label alphabet and size.

    Used by the scalability tables (paper Fig. 10 / Fig. 18 / Table 6):
    the paper relabels and subsets the *em* graph; we regenerate the
    profile at the requested size/labels instead.
    """
    base = PROFILES["em"]
    prof = GraphProfile(
        n_labels=n_labels,
        avg_out_degree=base.avg_out_degree,
        degree_skew=base.degree_skew,
        label_skew=base.label_skew,
    )
    return generate_graph(
        spark, n_nodes=n_nodes, profile=prof, seed=seed, name=f"em-{n_nodes}n-{n_labels}l"
    ).cache()
