"""Distributed connected components on a DataFrame edge list.

Hash-min label propagation with pointer jumping, expressed purely in the
DataFrame API (Catalyst plans the joins; no RDD code). Each round every
vertex adopts the minimum label among itself and its neighbours, then
labels are path-compressed by a self-join (label := label-of-label),
which brings convergence to O(log n) rounds on typical graphs — the
same round structure as the two-phase "large-star/small-star" algorithm.

Contract: only vertices incident to at least one edge appear in the
output (an isolated vertex is trivially its own component); labels
converge to the **minimum vertex id** of each component, matching
:func:`repro.cc.local_cc.cc_labels`.
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F


def dataframe_cc(edges: DataFrame, *, max_iter: int = 64) -> DataFrame:
    """CC labels for an undirected edge list DataFrame (columns u, v).

    Returns a DataFrame (vid, label). Raises if not converged within
    ``max_iter`` rounds (log-n rounds suffice in practice; 64 covers any
    graph this repo can hold).
    """
    sym = edges.select("u", "v").union(
        edges.select(F.col("v").alias("u"), F.col("u").alias("v"))
    )
    sym = sym.persist()
    lab = (
        sym.select(F.col("u").alias("vid"))
        .distinct()
        .withColumn("label", F.col("vid"))
        .localCheckpoint()
    )
    try:
        for _ in range(max_iter):
            nbr = sym.join(lab, sym["v"] == lab["vid"]).select(
                sym["u"].alias("vid"), F.col("label")
            )
            cand = (
                nbr.union(lab)
                .groupBy("vid")
                .agg(F.min("label").alias("label"))
            )
            a, b = cand.alias("a"), cand.alias("b")
            jumped = a.join(
                b, F.col("a.label") == F.col("b.vid"), "left"
            ).select(
                F.col("a.vid").alias("vid"),
                F.coalesce(F.col("b.label"), F.col("a.label")).alias("label"),
            )
            jumped = jumped.localCheckpoint()
            changed = (
                jumped.alias("n")
                .join(lab.alias("o"), "vid")
                .where(F.col("n.label") != F.col("o.label"))
                .count()
            )
            lab = jumped
            if changed == 0:
                return lab
        raise RuntimeError(f"dataframe_cc did not converge in {max_iter} rounds")
    finally:
        sym.unpersist()
