"""Directed-graph substrate shared by every algorithm in the reproduction.

A :class:`Graph` owns two synchronized representations of the same edge set:

* a Spark DataFrame of edges ``(src, dst)`` — the distributed-dataflow side,
  used by the DataFrame mat-vec engine and by the DuckDB oracle tests;
* numpy arrays (edge lists, in-degrees, in-adjacency CSR) — the vectorized
  kernel side, broadcast once per graph to executors for the random-walk and
  local-exploitation phases (``mapInPandas`` tasks index into them directly).

Edge semantics follow the paper: a directed edge ``u -> v`` makes ``u`` an
*in-neighbor* of ``v`` (``u ∈ I(v)``).  The reverse transition matrix is
``P(i, j) = 1 / d_in(v_j)`` for ``v_i ∈ I(v_j)``, i.e. one weighted entry per
edge ``(i -> j)``.  Undirected graphs are materialized with both directions
present, so ``I(v)`` equals the neighbor set.
"""
from __future__ import annotations

from dataclasses import dataclass, field
from typing import Optional

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F


@dataclass(frozen=True)
class CSRGraph:
    """Plain-numpy view of a graph, cheap to pickle into a Spark broadcast.

    ``in_indptr``/``in_neighbors`` form a CSR over *in*-adjacency: the
    in-neighbors of node ``v`` are ``in_neighbors[in_indptr[v]:in_indptr[v+1]]``.
    A (√c-)walk step from ``v`` picks uniformly from that slice; ``din[v] == 0``
    forces the walk to stop (the paper's dead-end semantics).
    """

    n: int
    src: np.ndarray  # int64 [m] — edge sources
    dst: np.ndarray  # int64 [m] — edge destinations
    din: np.ndarray  # int64 [n] — in-degrees
    in_indptr: np.ndarray  # int64 [n+1]
    in_neighbors: np.ndarray  # int64 [m]

    @property
    def m(self) -> int:
        return int(self.src.shape[0])

    def in_neigh(self, v: int) -> np.ndarray:
        """In-neighbor ids of node ``v`` (possibly empty)."""
        return self.in_neighbors[self.in_indptr[v] : self.in_indptr[v + 1]]

    def edge_bytes(self) -> int:
        """In-memory edge-list footprint (two int64 columns)."""
        return 2 * 8 * self.m

    def csr_bytes(self) -> int:
        """Graph size as int32 CSR adjacency, both directions — the storage
        convention the paper's Table 3 'Graph size' row corresponds to
        (its per-edge byte cost is ~8-10 B)."""
        return 2 * (4 * self.m + 4 * (self.n + 1))


def build_csr(n: int, src: np.ndarray, dst: np.ndarray) -> CSRGraph:
    """Build the in-adjacency CSR from an edge list.

    Edges must already be deduplicated and self-loop free; both are validated
    because a duplicate edge silently changes transition probabilities.
    """
    src = np.asarray(src, dtype=np.int64)
    dst = np.asarray(dst, dtype=np.int64)
    if src.shape != dst.shape:
        raise ValueError("src/dst length mismatch")
    if src.size and (src.min() < 0 or dst.min() < 0 or max(src.max(), dst.max()) >= n):
        raise ValueError("node id out of range")
    if np.any(src == dst):
        raise ValueError("self-loops are not allowed")
    key = src * n + dst
    if np.unique(key).size != key.size:
        raise ValueError("duplicate edges are not allowed")
    din = np.bincount(dst, minlength=n).astype(np.int64)
    order = np.argsort(dst, kind="stable")
    in_indptr = np.zeros(n + 1, dtype=np.int64)
    np.cumsum(din, out=in_indptr[1:])
    return CSRGraph(
        n=n,
        src=src,
        dst=dst,
        din=din,
        in_indptr=in_indptr,
        in_neighbors=src[order],
    )


@dataclass
class Graph:
    """A named graph with Spark and numpy views kept in lockstep."""

    name: str
    directed: bool
    csr: CSRGraph
    spark: Optional[SparkSession] = None
    _edges_df: Optional[DataFrame] = field(default=None, repr=False)
    _bc = None  # pyspark Broadcast of the CSRGraph

    @property
    def n(self) -> int:
        return self.csr.n

    @property
    def m(self) -> int:
        return self.csr.m

    def edges_pdf(self) -> pd.DataFrame:
        """Edge list as pandas — the DuckDB oracle's input table."""
        return pd.DataFrame({"src": self.csr.src, "dst": self.csr.dst})

    def edges_df(self) -> DataFrame:
        """Edge list as a cached Spark DataFrame ``(src, dst)``."""
        if self._edges_df is None:
            if self.spark is None:
                raise RuntimeError("Graph was built without a SparkSession")
            self._edges_df = self.spark.createDataFrame(self.edges_pdf()).cache()
        return self._edges_df

    def transition_df(self) -> DataFrame:
        """Reverse transition matrix ``P`` as weighted edges.

        One row per graph edge ``(src, dst)`` with ``w = 1/d_in(dst)`` — the
        entry ``P(src, dst)``.  Built with a window-free aggregation join so
        the plan is a plain shuffle (exercised under the disabled-broadcast
        session config).
        """
        e = self.edges_df()
        din = e.groupBy("dst").agg(F.count("*").alias("din"))
        return e.join(din, "dst").select(
            "src", "dst", (F.lit(1.0) / F.col("din")).alias("w")
        )

    def broadcast_csr(self):
        """Broadcast the numpy CSR once; reused by all walk/push stages."""
        if self._bc is None:
            if self.spark is None:
                raise RuntimeError("Graph was built without a SparkSession")
            self._bc = self.spark.sparkContext.broadcast(self.csr)
        return self._bc

    # ------------------------------------------------------------------
    # Dense references (small graphs only — test oracles).
    # ------------------------------------------------------------------
    def dense_P(self) -> np.ndarray:
        """Dense reverse transition matrix ``P`` (n×n); small graphs only."""
        if self.n > 5000:
            raise ValueError("dense_P is a small-graph test oracle")
        P = np.zeros((self.n, self.n))
        d = self.csr.din[self.csr.dst].astype(float)
        np.add.at(P, (self.csr.src, self.csr.dst), 1.0 / d)
        return P


def from_edges(
    name: str,
    n: int,
    src: np.ndarray,
    dst: np.ndarray,
    *,
    directed: bool,
    spark: Optional[SparkSession] = None,
) -> Graph:
    """Construct a :class:`Graph`; undirected inputs must already be symmetric."""
    return Graph(name=name, directed=directed, csr=build_csr(n, src, dst), spark=spark)
