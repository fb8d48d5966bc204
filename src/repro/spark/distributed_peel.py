"""Distributed 2(1+eps)-approximate peeling as iterative Spark dataflow.

The paper's "run the peeling algorithm periodically from scratch"
baseline is a single-machine C++ loop; at Grab scale the practical
scratch detector is the MapReduce/streaming peel of Bahmani et
al. [VLDB'12] (the paper's reference [2]): instead of removing one
minimum vertex per step, each round removes *every* vertex whose
peeling weight is at most ``2(1+eps)`` times the current density. This
terminates in ``O(log(n)/eps)`` rounds and guarantees

    g(S_best)  >=  g(S*) / (2 (1 + eps)),

because each removal round eliminates at least an ``eps/(1+eps)``
fraction of the remaining vertices (Σ w_v(S) <= 2 f(S)) and the round
preceding the optimum's destruction certifies the bound.

Implemented purely with DataFrame operations: per-round weighted
degrees via union + groupBy, density via a global aggregate, removal
via an anti-join, with ``localCheckpoint`` truncating the growing
lineage each round — the canonical iterative-dataflow idiom.
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import List, Optional, Tuple

from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F


@dataclass
class DistPeelResult:
    """Outcome of the distributed peel."""

    best_density: float
    best_round: int
    rounds: List[Tuple[int, int, float]]  # (round, |S|, g(S)) per round
    members: DataFrame  # vertices of the best S: column ``v``


def _round_state(
    edges: DataFrame, verts: DataFrame
) -> Tuple[DataFrame, float, int, float]:
    """Weighted degrees restricted to S, plus (f, n, g) of the round."""
    # Keep only edges with both endpoints alive.
    e = (
        edges.join(verts.select(F.col("v").alias("src")), "src")
        .join(verts.select(F.col("v").alias("dst")), "dst")
    )
    w_out = e.groupBy(F.col("src").alias("v")).agg(F.sum("weight").alias("w"))
    w_in = e.groupBy(F.col("dst").alias("v")).agg(F.sum("weight").alias("w"))
    wdeg = (
        w_out.union(w_in)
        .groupBy("v")
        .agg(F.sum("w").alias("wdeg"))
    )
    scored = (
        verts.join(wdeg, "v", "left")
        .select(
            "v",
            "a",
            (F.col("a") + F.coalesce("wdeg", F.lit(0.0))).alias("peel_w"),
        )
    )
    agg = scored.agg(
        F.sum("a").alias("a_sum"),
        F.sum("peel_w").alias("w_sum"),
        F.count(F.lit(1)).alias("n"),
    ).collect()[0]
    n = int(agg["n"])
    # Σ peel_w = Σa + 2Σc  =>  f = Σa + Σc = (Σ peel_w + Σ a) / 2.
    f = (float(agg["w_sum"]) + float(agg["a_sum"])) / 2.0
    g = f / n if n else 0.0
    return scored, f, n, g


def distributed_peel(
    spark: SparkSession,
    edges: DataFrame,
    vertices: DataFrame,
    eps: float = 0.5,
    max_rounds: int = 200,
) -> DistPeelResult:
    """Approximate densest-subgraph detection over DataFrames.

    ``edges`` must carry ``(src, dst, weight)`` (see
    :func:`repro.spark.builder.edge_weights`); ``vertices`` carries
    ``(v, a)`` vertex suspiciousness. Returns the best round's density
    and its member set.
    """
    verts = vertices.select("v", F.col("a").cast("double")).localCheckpoint()
    e = edges.select("src", "dst", F.col("weight").cast("double")).localCheckpoint()
    rounds: List[Tuple[int, int, float]] = []
    removed_at: List[Tuple[DataFrame, int]] = []
    best_g, best_round = float("-inf"), 0
    r = 0
    while r < max_rounds:
        scored, f, n, g = _round_state(e, verts)
        if n == 0:
            break
        rounds.append((r, n, g))
        if g > best_g:
            best_g, best_round = g, r
        thresh = 2.0 * (1.0 + eps) * g
        doomed = scored.filter(F.col("peel_w") <= thresh).select("v")
        doomed = doomed.localCheckpoint()
        n_doomed = doomed.count()
        if n_doomed == 0:
            # Cannot happen for eps > 0 (counting argument), but guard
            # against float pathologies: drop the minimum instead.
            doomed = scored.orderBy("peel_w").limit(1).select("v").localCheckpoint()
            n_doomed = 1
        removed_at.append((doomed, r))
        verts = (
            verts.join(doomed.withColumnRenamed("v", "rv"),
                       verts["v"] == F.col("rv"), "left_anti")
            .localCheckpoint()
        )
        if n_doomed == n:
            break
        r += 1

    # Best S = every vertex removed at round >= best_round (vertices
    # alive at the start of best_round), plus anything still alive if
    # the round cap stopped the loop early.
    survivors = [df for df, rr in removed_at if rr >= best_round]
    if verts.limit(1).count() > 0:
        survivors.append(verts.select("v"))
    if survivors:
        members = survivors[0]
        for df in survivors[1:]:
            members = members.union(df)
        members = members.distinct()
    else:
        members = vertices.select("v").limit(0)
    return DistPeelResult(
        best_density=best_g if best_g != float("-inf") else 0.0,
        best_round=best_round,
        rounds=rounds,
        members=members,
    )
