"""Bloom-Filter-Labeling-style reachability index (BFL [50] substitute).

The paper's GM uses BFL: each node gets hash-set labels summarizing its
descendant (and ancestor) sets; ``u ≺ v`` is *refuted* in O(1) when
``v``'s label is not contained in ``u``'s out-label, and verified
otherwise. We reproduce the same structure as a dataflow computation:

* each node hashes to one bit of a 64-bit Bloom word;
* ``L_out(v)`` = own bit OR-ed with the ``L_out`` of all successors
  (fixpoint via iterative join + ``bit_or`` aggregation — monotone, so
  it converges on cyclic graphs too);
* ``L_in`` symmetric over predecessors.

``u ≺ v`` requires ``L_out(v) ⊆ L_out(u)`` and ``L_in(u) ⊆ L_in(v)``
(bitwise containment). That is a *necessary* condition — the index is a
sound negative filter, and positives are confirmed against the exact
``reach`` relation (repro.reach.closure), mirroring BFL's
filter-then-verify design. Build time of this index vs the transitive
closure is what the paper's Fig. 18(a) table measures.
"""
from __future__ import annotations

from dataclasses import dataclass

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

_BITS = 64


def _hash_bit(col_name: str):
    """Map a node id to a single bit of the 64-bit Bloom word.

    SQL expression because pyspark's ``shiftleft`` only takes a literal
    shift amount, not a column.
    """
    return F.expr(
        f"shiftleft(1L, cast((xxhash64({col_name}) % {_BITS} + {_BITS}) % {_BITS} as int))"
    )


def _propagate(nodes: DataFrame, edges: DataFrame, *, max_iter: int = 64) -> DataFrame:
    """Fused fixpoint of both Bloom labels in one pass per round.

    ``bloom_out(v) = bit(v) | OR_{(v,w)∈E} bloom_out(w)`` and the
    symmetric ``bloom_in`` are monotone under bitwise OR, so both are
    advanced in the SAME round (one checkpoint + one signature action)
    until the global popcount stops changing — halving the Spark-job
    count vs two separate fixpoints.
    """
    lab = nodes.select(
        "id",
        _hash_bit("id").alias("bloom_out"),
        _hash_bit("id").alias("bloom_in"),
    ).localCheckpoint(eager=True)
    prev_sig = None
    for _ in range(max_iter):
        from_succ = (
            edges.join(lab, F.col("dst") == F.col("id"))
            .groupBy(F.col("src").alias("id"))
            .agg(F.bit_or("bloom_out").alias("nb_out"))
        )
        from_pred = (
            edges.join(lab, F.col("src") == F.col("id"))
            .groupBy(F.col("dst").alias("id"))
            .agg(F.bit_or("bloom_in").alias("nb_in"))
        )
        lab = (
            lab.join(from_succ, "id", "left")
            .join(from_pred, "id", "left")
            .select(
                "id",
                F.col("bloom_out")
                .bitwiseOR(F.coalesce(F.col("nb_out"), F.lit(0).cast("long")))
                .alias("bloom_out"),
                F.col("bloom_in")
                .bitwiseOR(F.coalesce(F.col("nb_in"), F.lit(0).cast("long")))
                .alias("bloom_in"),
            )
            .localCheckpoint(eager=True)
        )
        sig = lab.agg(
            (F.sum(F.bit_count("bloom_out")) + F.sum(F.bit_count("bloom_in"))).alias("s")
        ).first()["s"]
        if sig == prev_sig:
            break
        prev_sig = sig
    return lab


@dataclass
class BFLIndex:
    """Bloom labels of a data graph: ``labels(id, bloom_out, bloom_in)``."""

    labels: DataFrame

    def filter_pairs(self, pairs: DataFrame) -> DataFrame:
        """Keep only pairs ``(src,dst)`` the Bloom labels cannot refute.

        Sound filter: every truly reachable pair survives; some
        unreachable pairs survive too (Bloom false positives) and must
        be verified against the exact closure.
        """
        lo = self.labels.select(
            F.col("id").alias("src"),
            F.col("bloom_out").alias("so"),
            F.col("bloom_in").alias("si"),
        )
        ld = self.labels.select(
            F.col("id").alias("dst"),
            F.col("bloom_out").alias("do"),
            F.col("bloom_in").alias("di"),
        )
        return (
            pairs.join(lo, "src")
            .join(ld, "dst")
            .where(F.expr("(do & ~so) = 0 AND (si & ~di) = 0"))
            .select(pairs.columns)
        )


def build_bfl(nodes: DataFrame, edges: DataFrame) -> BFLIndex:
    """Build the Bloom out/in labels for a data graph."""
    return BFLIndex(labels=_propagate(nodes, edges))
