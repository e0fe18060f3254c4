"""Centrality-based seed-selection baselines (paper §VIII-A).

* ``degree_seeds`` — Degree Centrality (DC): top-k by out-degree (the
  count of users a node directly influences; self-loops excluded).
* ``pagerank_seeds`` — PR on the *reverse* graph, so mass accumulates at
  nodes that reach many others ("more frequently reached nodes in a
  random traversal are more likely to influence other users").
* ``rwr_seeds`` — Random Walk with Restart [25]: personalized PageRank
  whose restart vector is proportional to the target candidate's initial
  opinions, biasing the ranking toward the target's support base.

PageRank/RWR are iterative Spark DataFrame jobs (join-aggregate per
round, persisted), each with a NumPy reference for testing.
"""
from __future__ import annotations

import numpy as np
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from repro.graphs.graph import OpinionGraph

_CHECKPOINT_EVERY = 5


def degree_seeds(spark: SparkSession, graph: OpinionGraph, k: int) -> list[int]:
    """Top-k out-degree nodes via a Spark aggregation."""
    edges = graph.to_spark_edges(spark)
    rows = (
        edges.where(F.col("src") != F.col("dst"))
        .groupBy(F.col("src").alias("v"))
        .agg(F.count("*").alias("deg"))
        .orderBy(F.col("deg").desc(), F.col("v"))
        .limit(k)
        .collect()
    )
    seeds = [int(r["v"]) for r in rows]
    # Isolated nodes (no out-edges) rank last; pad deterministically.
    i = 0
    while len(seeds) < k:
        if i not in seeds:
            seeds.append(i)
        i += 1
    return seeds


def _pr_edges(graph: OpinionGraph, reverse: bool) -> tuple[np.ndarray, np.ndarray, np.ndarray]:
    """Row-stochastic transition edges for PR (uniform over out-edges)."""
    keep = graph.src != graph.dst
    src, dst = graph.src[keep], graph.dst[keep]
    if reverse:
        src, dst = dst, src
    deg = np.zeros(graph.n)
    np.add.at(deg, src, 1.0)
    w = 1.0 / deg[src]
    return src, dst, w


def pagerank_np(
    graph: OpinionGraph,
    *,
    reverse: bool = True,
    damping: float = 0.85,
    iters: int = 20,
    restart: np.ndarray | None = None,
) -> np.ndarray:
    """NumPy PR/RWR reference: π ← c·πP + (1−c)·restart (dangling → restart)."""
    n = graph.n
    src, dst, w = _pr_edges(graph, reverse)
    r = np.full(n, 1.0 / n) if restart is None else restart / restart.sum()
    pi = r.copy()
    has_out = np.zeros(n, dtype=bool)
    has_out[src] = True
    for _ in range(iters):
        out = np.zeros(n)
        np.add.at(out, dst, pi[src] * w)
        dangling = pi[~has_out].sum()
        pi = damping * (out + dangling * r) + (1.0 - damping) * r
    return pi


def _pagerank_df(
    spark: SparkSession,
    graph: OpinionGraph,
    *,
    reverse: bool,
    damping: float,
    iters: int,
    restart: np.ndarray | None,
) -> DataFrame:
    """Iterative DataFrame PageRank — returns (v, pi)."""
    import pandas as pd

    n = graph.n
    src, dst, w = _pr_edges(graph, reverse)
    edges = spark.createDataFrame(
        pd.DataFrame({"src": src.astype("int64"), "dst": dst.astype("int64"), "w": w})
    )
    r = np.full(n, 1.0 / n) if restart is None else restart / restart.sum()
    has_out = np.zeros(n, dtype=bool)
    has_out[src] = True
    base = spark.createDataFrame(
        pd.DataFrame(
            {
                "v": np.arange(n, dtype="int64"),
                "restart": r,
                "has_out": has_out,
            }
        )
    ).persist()
    pi = base.select("v", F.col("restart").alias("pi"))
    for step in range(iters):
        dangling = (
            pi.join(base.select("v", "has_out"), on="v")
            .where(~F.col("has_out"))
            .agg(F.sum("pi"))
            .collect()[0][0]
            or 0.0
        )
        flow = (
            edges.join(pi.withColumnRenamed("v", "src"), on="src")
            .groupBy(F.col("dst").alias("v"))
            .agg(F.sum(F.col("w") * F.col("pi")).alias("flow"))
        )
        pi = (
            base.select("v", "restart")
            .join(flow, on="v", how="left")
            .select(
                "v",
                (
                    F.lit(damping)
                    * (F.coalesce(F.col("flow"), F.lit(0.0)) + F.lit(float(dangling)) * F.col("restart"))
                    + F.lit(1.0 - damping) * F.col("restart")
                ).alias("pi"),
            )
            .persist()
        )
        pi.count()
        if (step + 1) % _CHECKPOINT_EVERY == 0:
            pi = pi.localCheckpoint(eager=True)
    return pi


def pagerank_seeds(
    spark: SparkSession,
    graph: OpinionGraph,
    k: int,
    *,
    damping: float = 0.85,
    iters: int = 20,
) -> list[int]:
    """Top-k PageRank (reverse-graph) nodes."""
    pi = _pagerank_df(
        spark, graph, reverse=True, damping=damping, iters=iters, restart=None
    )
    rows = pi.orderBy(F.col("pi").desc(), F.col("v")).limit(k).collect()
    return [int(r["v"]) for r in rows]


def rwr_seeds(
    spark: SparkSession,
    graph: OpinionGraph,
    k: int,
    target: int,
    *,
    damping: float = 0.85,
    iters: int = 20,
) -> list[int]:
    """Top-k Random-Walk-with-Restart nodes (restart ∝ target's b0)."""
    restart = graph.b0[target] + 1e-9
    pi = _pagerank_df(
        spark, graph, reverse=True, damping=damping, iters=iters, restart=restart
    )
    rows = pi.orderBy(F.col("pi").desc(), F.col("v")).limit(k).collect()
    return [int(r["v"]) for r in rows]
