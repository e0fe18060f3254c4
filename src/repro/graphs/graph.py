"""Opinion-graph substrate (paper §II).

``OpinionGraph`` is the canonical in-memory representation of one problem
instance: a directed graph with a column-stochastic influence matrix ``W``
(``w[i, j]`` = influence of user *i* on user *j*; incoming weights of every
node sum to 1), an initial-opinion matrix ``b0 ∈ [0,1]^{r×n}`` and a
stubbornness matrix ``d ∈ [0,1]^{r×n}`` — one row per candidate.

Storage is NumPy (edges as COO sorted by ``dst``) so that instances are
deterministic, cheaply broadcastable to Spark executors, and usable by the
pure-NumPy reference implementations.  ``to_spark_edges`` /
``to_spark_state`` export the instance as DataFrames for the Spark SQL
jobs; all distributed algorithms consume those DataFrames.

Normalization convention: the paper states that users without in-neighbors
retain their initial opinions (DeGroot); we realize this with an implicit
self-loop of weight 1 on every in-degree-0 node, which makes ``W`` truly
column-stochastic and lets every kernel treat all nodes uniformly.
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession


@dataclass
class AliasTable:
    """Walker alias tables for O(1) weighted sampling of one in-neighbor.

    Built over the *reverse* graph: for node ``v``, sampling returns one of
    ``v``'s in-neighbors ``u`` with probability ``w[u, v]``.  Arrays are
    aligned with the reverse-CSR ``indices`` layout.
    """

    indptr: np.ndarray  # (n+1,) int64 — reverse-CSR row pointers
    indices: np.ndarray  # (nnz,) int32 — in-neighbor ids
    prob: np.ndarray  # (nnz,) float64 — alias acceptance probabilities
    alias: np.ndarray  # (nnz,) int32 — alias slot (local index within row)

    def sample(self, nodes: np.ndarray, rng: np.random.Generator) -> np.ndarray:
        """Vectorized draw of one in-neighbor for each node in ``nodes``."""
        deg = self.indptr[nodes + 1] - self.indptr[nodes]
        # Every node has >=1 in-edge after self-loop normalization.
        slot = (rng.random(len(nodes)) * deg).astype(np.int64)
        base = self.indptr[nodes] + slot
        accept = rng.random(len(nodes)) < self.prob[base]
        local = np.where(accept, slot, self.alias[base])
        return self.indices[self.indptr[nodes] + local]


def _build_alias_row(p: np.ndarray) -> tuple[np.ndarray, np.ndarray]:
    """Walker's alias method for one probability row (sums to 1)."""
    k = len(p)
    prob = np.zeros(k)
    alias = np.zeros(k, dtype=np.int32)
    scaled = p * k
    small = [i for i in range(k) if scaled[i] < 1.0]
    large = [i for i in range(k) if scaled[i] >= 1.0]
    scaled = scaled.copy()
    while small and large:
        s, l = small.pop(), large.pop()
        prob[s] = scaled[s]
        alias[s] = l
        scaled[l] = scaled[l] - (1.0 - scaled[s])
        (small if scaled[l] < 1.0 else large).append(l)
    for i in large + small:
        prob[i] = 1.0
    return prob, alias


@dataclass
class OpinionGraph:
    """One FJ-Vote problem instance (graph + opinions + stubbornness)."""

    n: int
    src: np.ndarray  # (m,) int32 — edge sources, sorted by dst
    dst: np.ndarray  # (m,) int32 — edge destinations (sorted)
    w: np.ndarray  # (m,) float64 — column-stochastic: sum of w per dst == 1
    b0: np.ndarray  # (r, n) float64 in [0,1] — initial opinions per candidate
    d: np.ndarray  # (r, n) float64 in [0,1] — stubbornness per candidate
    candidates: list[str] = field(default_factory=list)
    _rev_csr: AliasTable | None = field(default=None, repr=False)

    # ------------------------------------------------------------------ #
    # Construction & validation
    # ------------------------------------------------------------------ #
    @staticmethod
    def from_edges(
        n: int,
        src: np.ndarray,
        dst: np.ndarray,
        weight: np.ndarray,
        b0: np.ndarray,
        d: np.ndarray,
        candidates: list[str] | None = None,
    ) -> "OpinionGraph":
        """Build an instance, normalizing ``weight`` to be column-stochastic.

        Raw non-negative weights are accepted; per-destination they are
        rescaled to sum to 1.  In-degree-0 nodes get a weight-1 self-loop
        (paper: such users retain their initial opinions).
        """
        src = np.asarray(src, dtype=np.int32)
        dst = np.asarray(dst, dtype=np.int32)
        weight = np.asarray(weight, dtype=np.float64)
        if (weight < 0).any():
            raise ValueError("edge weights must be non-negative")
        if len(src) and (max(src.max(), dst.max()) >= n or min(src.min(), dst.min()) < 0):
            raise ValueError("node ids out of range")
        # Drop zero-weight edges (paper: E is the union of non-zero edges).
        keep = weight > 0
        src, dst, weight = src[keep], dst[keep], weight[keep]
        in_sum = np.zeros(n)
        np.add.at(in_sum, dst, weight)
        orphans = np.flatnonzero(in_sum == 0)
        if len(orphans):
            src = np.concatenate([src, orphans.astype(np.int32)])
            dst = np.concatenate([dst, orphans.astype(np.int32)])
            weight = np.concatenate([weight, np.ones(len(orphans))])
            in_sum[orphans] = 1.0
        weight = weight / in_sum[dst]
        order = np.lexsort((src, dst))
        b0 = np.atleast_2d(np.asarray(b0, dtype=np.float64))
        d = np.atleast_2d(np.asarray(d, dtype=np.float64))
        if b0.shape != d.shape or b0.shape[1] != n:
            raise ValueError(f"b0/d shape mismatch: {b0.shape} vs {d.shape}, n={n}")
        if ((b0 < 0) | (b0 > 1)).any() or ((d < 0) | (d > 1)).any():
            raise ValueError("b0 and d entries must lie in [0, 1]")
        cands = candidates or [f"c{i+1}" for i in range(b0.shape[0])]
        if len(cands) != b0.shape[0]:
            raise ValueError("candidate count must match b0 rows")
        return OpinionGraph(
            n=n,
            src=src[order],
            dst=dst[order],
            w=weight[order],
            b0=b0,
            d=d,
            candidates=list(cands),
        )

    @property
    def r(self) -> int:
        """Number of candidates."""
        return self.b0.shape[0]

    @property
    def m(self) -> int:
        """Number of (normalized) edges, self-loops included."""
        return len(self.src)

    def validate(self) -> None:
        """Assert the column-stochastic invariant (used by tests)."""
        in_sum = np.zeros(self.n)
        np.add.at(in_sum, self.dst, self.w)
        if not np.allclose(in_sum, 1.0):
            raise AssertionError("W is not column-stochastic")

    # ------------------------------------------------------------------ #
    # Seeds
    # ------------------------------------------------------------------ #
    def with_seeds(self, cand: int, seeds) -> "OpinionGraph":
        """Return a copy with ``b0[cand, S] = d[cand, S] = 1`` (paper §II-C)."""
        b0 = self.b0.copy()
        d = self.d.copy()
        seeds = np.asarray(list(seeds), dtype=np.int64)
        if len(seeds):
            b0[cand, seeds] = 1.0
            d[cand, seeds] = 1.0
        return OpinionGraph(
            self.n, self.src, self.dst, self.w, b0, d, list(self.candidates)
        )

    def dst_indptr(self) -> np.ndarray:
        """Segment boundaries of the dst-sorted edge arrays (for reduceat).

        Every node has ≥1 in-edge after self-loop normalization, so the
        segments enumerate all n nodes in order.
        """
        indptr = np.zeros(self.n + 1, dtype=np.int64)
        np.add.at(indptr, self.dst + 1, 1)
        return np.cumsum(indptr)

    def dense_w(self) -> np.ndarray:
        """Dense (n×n) influence matrix — BLAS path for small graphs."""
        W = np.zeros((self.n, self.n))
        np.add.at(W, (self.src, self.dst), self.w)
        return W

    # ------------------------------------------------------------------ #
    # Reverse-graph structures (for random walks)
    # ------------------------------------------------------------------ #
    def reverse_alias(self) -> AliasTable:
        """Alias tables over the reverse graph (cached)."""
        if self._rev_csr is None:
            order = np.argsort(self.dst, kind="stable")
            dsts = self.dst[order]
            indptr = np.zeros(self.n + 1, dtype=np.int64)
            np.add.at(indptr, dsts + 1, 1)
            indptr = np.cumsum(indptr)
            indices = self.src[order].astype(np.int32)
            ws = self.w[order]
            prob = np.empty(self.m)
            alias = np.empty(self.m, dtype=np.int32)
            for v in range(self.n):
                lo, hi = indptr[v], indptr[v + 1]
                p, a = _build_alias_row(ws[lo:hi])
                prob[lo:hi] = p
                alias[lo:hi] = a
            self._rev_csr = AliasTable(indptr, indices, prob, alias)
        return self._rev_csr

    def out_adjacency(self) -> tuple[np.ndarray, np.ndarray]:
        """Forward-CSR (indptr, indices) over the *original* edge direction,
        self-loops excluded — used for t-hop reachable sets (Def. 2)."""
        keep = self.src != self.dst
        src, dst = self.src[keep], self.dst[keep]
        order = np.argsort(src, kind="stable")
        src, dst = src[order], dst[order]
        indptr = np.zeros(self.n + 1, dtype=np.int64)
        np.add.at(indptr, src + 1, 1)
        return np.cumsum(indptr), dst.astype(np.int32)

    # ------------------------------------------------------------------ #
    # Spark exporters
    # ------------------------------------------------------------------ #
    def to_spark_edges(self, spark: SparkSession) -> DataFrame:
        """Edges as a DataFrame ``(src, dst, w)`` with self-loops included."""
        return spark.createDataFrame(
            pd.DataFrame(
                {
                    "src": self.src.astype("int64"),
                    "dst": self.dst.astype("int64"),
                    "w": self.w,
                }
            )
        )

    def to_spark_state(
        self, spark: SparkSession, cand: int | None = None
    ) -> DataFrame:
        """Opinion state as a long DataFrame ``(node, cand, b, b0, d)``.

        ``b`` starts equal to ``b0``; diffusion jobs rewrite ``b``.  When
        ``cand`` is given, only that candidate's row block is exported.
        """
        cands = range(self.r) if cand is None else [cand]
        frames = [
            pd.DataFrame(
                {
                    "node": np.arange(self.n, dtype="int64"),
                    "cand": np.int32(q),
                    "b": self.b0[q],
                    "b0": self.b0[q],
                    "d": self.d[q],
                }
            )
            for q in cands
        ]
        return spark.createDataFrame(pd.concat(frames, ignore_index=True))

    def edges_pdf(self) -> pd.DataFrame:
        """Edges as pandas (for the DuckDB oracle)."""
        return pd.DataFrame(
            {"src": self.src.astype("int64"), "dst": self.dst.astype("int64"), "w": self.w}
        )

    def state_pdf(self, cand: int | None = None) -> pd.DataFrame:
        """Opinion state as pandas (for the DuckDB oracle)."""
        cands = range(self.r) if cand is None else [cand]
        return pd.concat(
            [
                pd.DataFrame(
                    {
                        "node": np.arange(self.n, dtype="int64"),
                        "cand": np.int32(q),
                        "b": self.b0[q],
                        "b0": self.b0[q],
                        "d": self.d[q],
                    }
                )
                for q in cands
            ],
            ignore_index=True,
        )


def spmv_dst(graph: OpinionGraph, x: np.ndarray) -> np.ndarray:
    """``y[j] = Σ_i x[i]·w[i,j]`` — one FJ aggregation, edges sorted by dst.

    Pure NumPy (no scipy in this container): contributions are segment-
    reduced with ``np.add.reduceat`` over the dst-sorted COO arrays.
    """
    contrib = x[..., graph.src] * graph.w
    if contrib.ndim == 1:
        y = np.zeros(graph.n)
        np.add.at(y, graph.dst, contrib)
        return y
    y = np.zeros(contrib.shape[:-1] + (graph.n,))
    np.add.at(y.swapaxes(-1, 0), graph.dst, contrib.swapaxes(-1, 0))
    return y
