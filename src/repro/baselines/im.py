"""IC/LT influence-maximization baselines via RR-set sketches (paper §VIII-A).

The paper compares against seed selection under the Independent Cascade
and Linear Threshold diffusion models, each coupled with IMM [3].  We
implement the reverse-reachable (RR) set machinery:

* IC RR set from a uniformly random root: randomized reverse BFS — each
  incoming edge (u → v) is live with probability w_uv.
* LT RR set: a reverse path — at each node pick exactly one in-neighbor
  with probability equal to its edge weight (in-weights sum to 1), stop on
  a revisit.  (Our graphs carry a self-loop on in-degree-0 nodes, which
  simply ends the path.)
* Seed selection: greedy max-coverage over θ_im RR sets.

Substitution vs the paper (DESIGN.md §3): IMM's adaptive martingale
stopping rule is replaced by a fixed, generous θ_im; at our scale the
selected seeds coincide with IMM's with high probability.

``expected_influence_spread`` reproduces the §VIII-C EIS metric:
n/θ · #RR sets hit by S.
"""
from __future__ import annotations

from typing import Iterator

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F
from pyspark.sql import types as T

from repro.graphs.graph import OpinionGraph

_RR_SCHEMA = T.StructType(
    [
        T.StructField("sketch_id", T.LongType()),
        T.StructField("nodes", T.ArrayType(T.IntegerType())),
    ]
)


def _reverse_csr(graph: OpinionGraph):
    """(indptr, indices, weights) of the reverse graph, dst-major."""
    order = np.argsort(graph.dst, kind="stable")
    dsts = graph.dst[order]
    indptr = np.zeros(graph.n + 1, dtype=np.int64)
    np.add.at(indptr, dsts + 1, 1)
    return np.cumsum(indptr), graph.src[order].astype(np.int32), graph.w[order]


def rr_sets_np(
    graph: OpinionGraph, model: str, roots: np.ndarray, rng: np.random.Generator
) -> list[list[int]]:
    """RR sets for the given roots (reference kernel, also used per-partition)."""
    indptr, indices, wts = _reverse_csr(graph)
    alias = graph.reverse_alias()
    out: list[list[int]] = []
    for root in roots:
        if model == "ic":
            visited = {int(root)}
            frontier = [int(root)]
            while frontier:
                nxt: list[int] = []
                for v in frontier:
                    lo, hi = indptr[v], indptr[v + 1]
                    live = rng.random(hi - lo) < wts[lo:hi]
                    for u in indices[lo:hi][live]:
                        if int(u) not in visited:
                            visited.add(int(u))
                            nxt.append(int(u))
                frontier = nxt
            out.append(sorted(visited))
        elif model == "lt":
            visited = {int(root)}
            cur = int(root)
            while True:
                nxt = int(alias.sample(np.array([cur]), rng)[0])
                if nxt in visited:
                    break
                visited.add(nxt)
                cur = nxt
            out.append(sorted(visited))
        else:
            raise ValueError(f"unknown IM model: {model}")
    return out


def generate_rr_sets(
    spark: SparkSession,
    graph: OpinionGraph,
    model: str,
    theta: int,
    *,
    seed: int = 0,
) -> DataFrame:
    """θ RR sets as a DataFrame (sketch_id, nodes) — broadcast graph,
    distributed roots, per-partition vectorized kernel."""
    rng0 = np.random.default_rng(seed)
    roots = rng0.integers(0, graph.n, size=theta)
    bc = spark.sparkContext.broadcast(graph)
    work = spark.createDataFrame(
        pd.DataFrame({"sketch_id": np.arange(theta, dtype=np.int64), "root": roots})
    ).repartition(min(spark.sparkContext.defaultParallelism * 2, max(1, theta // 512)))

    def gen(pdfs: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
        g = bc.value
        for pdf in pdfs:
            if len(pdf) == 0:
                continue
            rng = np.random.default_rng(
                np.random.SeedSequence([seed, int(pdf["sketch_id"].iloc[0])])
            )
            sets = rr_sets_np(g, model, pdf["root"].to_numpy(), rng)
            yield pd.DataFrame(
                {"sketch_id": pdf["sketch_id"].to_numpy(), "nodes": sets}
            )

    return work.mapInPandas(gen, _RR_SCHEMA)


def select_seeds_im(
    spark: SparkSession,
    graph: OpinionGraph,
    model: str,
    k: int,
    *,
    theta: int = 20000,
    seed: int = 0,
) -> list[int]:
    """Greedy max-coverage over RR sets (IMM-lite seed selection)."""
    rr = generate_rr_sets(spark, graph, model, theta, seed=seed).persist()
    rr.count()
    seeds: list[int] = []
    remaining = rr
    for rnd in range(k):
        counts = (
            remaining.select(F.explode("nodes").alias("v"))
            .groupBy("v")
            .agg(F.count("*").alias("cov"))
            .orderBy(F.col("cov").desc(), F.col("v"))
            .limit(1)
            .collect()
        )
        if not counts:
            pool = [v for v in range(graph.n) if v not in seeds]
            seeds.append(int(pool[0]))
            continue
        u = int(counts[0]["v"])
        seeds.append(u)
        nxt = remaining.where(
            F.array_position(F.col("nodes"), F.lit(u)) == 0
        ).persist()
        nxt.count()
        remaining.unpersist()
        # Truncate lineage every couple of rounds — k chained filters
        # otherwise blow up the driver's plan bookkeeping.
        remaining = nxt.localCheckpoint(eager=True) if rnd % 2 == 1 else nxt
    remaining.unpersist()
    rr.unpersist()
    return seeds


def expected_influence_spread(
    spark: SparkSession,
    graph: OpinionGraph,
    model: str,
    seeds,
    *,
    theta: int = 20000,
    seed: int = 7,
) -> float:
    """EIS(S) ≈ n/θ · #{RR sets intersecting S} (§VIII-C)."""
    rr = generate_rr_sets(spark, graph, model, theta, seed=seed)
    seed_list = [int(s) for s in seeds]
    hit = rr.where(
        F.size(F.array_intersect(F.col("nodes"), F.array(*[F.lit(s) for s in seed_list]))) > 0
    ).count()
    return graph.n * hit / float(theta)
