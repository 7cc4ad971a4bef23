"""Sparse matrix–vector products for the (reverse) transition matrix ``P``.

Two engines compute the same arithmetic:

* ``numpy`` — ``np.bincount`` over the edge list.  Used by the parameter
  sweeps where the vector fits in driver memory (DESIGN.md §3).
* ``spark`` — the GraphX-``aggregateMessages`` equivalent in DataFrame form:
  join the weighted edge table with the vector table, ``groupBy`` the
  receiving endpoint, sum the messages.  Used to demonstrate the scale-out
  dataflow; tests assert bit-for-bit-level agreement with the numpy engine
  (up to fp summation order) and against the DuckDB oracle.

Conventions (see ``graphs/graph.py``): ``P(i, j) = 1/d_in(j)`` for each edge
``i -> j``.  Hence::

    (P  · v)(i) = Σ_{edges i->j} v(j) / d_in(j)      — "pull" along edges
    (Pᵀ · v)(j) = Σ_{edges i->j} v(i) / d_in(j)      — "push" along edges
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.graphs.graph import CSRGraph, Graph

# ---------------------------------------------------------------------------
# numpy engine
# ---------------------------------------------------------------------------


def matvec_P(csr: CSRGraph, v: np.ndarray) -> np.ndarray:
    """``P · v`` via one weighted bincount over the edge list."""
    if v.shape != (csr.n,):
        raise ValueError("vector length mismatch")
    d = csr.din[csr.dst].astype(np.float64)
    w = v[csr.dst] / d
    return np.bincount(csr.src, weights=w, minlength=csr.n)


def matvec_PT(csr: CSRGraph, v: np.ndarray) -> np.ndarray:
    """``Pᵀ · v`` via one weighted bincount over the edge list."""
    if v.shape != (csr.n,):
        raise ValueError("vector length mismatch")
    out = np.bincount(csr.dst, weights=v[csr.src], minlength=csr.n)
    nz = csr.din > 0
    out[nz] = out[nz] / csr.din[nz]
    return out


def expand_sparse(
    csr: CSRGraph, idx: np.ndarray, val: np.ndarray, *, prune: float = 0.0
) -> tuple[np.ndarray, np.ndarray, int]:
    """Sparse ``P · v`` by local push: distribute each entry to in-neighbors.

    ``P·v`` gathers ``v(j)/d_in(j)`` into every ``i ∈ I(j)`` — structurally,
    each nonzero entry is *pushed* along the reversed edges, which is the
    local-push primitive of PRSim and of Algorithm 3's BFS (where the same
    operation realizes ``M^t`` rows, since ``P = Mᵀ`` for the walk transition
    ``M``).  Entries landing at a value ``<= prune`` are dropped.  Returns
    ``(indices, values, edges_traversed)`` — the traversal count feeds the
    adaptive budgets.
    """
    keep = csr.din[idx] > 0
    idx, val = idx[keep], val[keep]
    if idx.size == 0:
        return idx, val, 0
    counts = csr.din[idx]
    total = int(counts.sum())
    rep = np.repeat(np.arange(idx.size), counts)
    offsets = np.arange(total) - np.repeat(np.cumsum(counts) - counts, counts)
    nbr = csr.in_neighbors[csr.in_indptr[idx][rep] + offsets]
    w = (val / counts)[rep]
    uniq, inv = np.unique(nbr, return_inverse=True)
    acc = np.bincount(inv, weights=w, minlength=uniq.size)
    keep2 = np.abs(acc) > prune
    return uniq[keep2], acc[keep2], total


# ---------------------------------------------------------------------------
# Spark DataFrame engine
# ---------------------------------------------------------------------------

VEC_COLS = ("id", "val")


def vec_to_df(graph: Graph, v: np.ndarray) -> DataFrame:
    """Sparse DataFrame view ``(id, val)`` of a numpy vector (zeros dropped)."""
    nz = np.flatnonzero(v)
    pdf = pd.DataFrame({"id": nz.astype(np.int64), "val": v[nz]})
    return graph.spark.createDataFrame(pdf, schema="id long, val double")


def df_to_vec(n: int, df: DataFrame) -> np.ndarray:
    """Collect a ``(id, val)`` DataFrame back into a dense numpy vector."""
    pdf = df.toPandas()
    out = np.zeros(n)
    if len(pdf):
        out[pdf["id"].to_numpy()] = pdf["val"].to_numpy()
    return out


def matvec_P_df(transition: DataFrame, vec: DataFrame) -> DataFrame:
    """``P · v`` as message passing: each edge ``i->j`` pulls ``w·v(j)`` to i.

    ``transition`` is ``Graph.transition_df()`` (``src, dst, w``), ``vec`` is a
    sparse ``(id, val)`` table.  The join keys on the *destination*, the
    aggregation lands on the *source* — the dataflow dual of ``matvec_PT_df``.
    """
    return (
        transition.join(vec, transition["dst"] == vec["id"])
        .groupBy(F.col("src").alias("id"))
        .agg(F.sum(F.col("w") * F.col("val")).alias("val"))
    )


def matvec_PT_df(transition: DataFrame, vec: DataFrame) -> DataFrame:
    """``Pᵀ · v``: each edge ``i->j`` pushes ``w·v(i)`` to j."""
    return (
        transition.join(vec, transition["src"] == vec["id"])
        .groupBy(F.col("dst").alias("id"))
        .agg(F.sum(F.col("w") * F.col("val")).alias("val"))
    )


def axpy_df(a: float, x: DataFrame, y: DataFrame) -> DataFrame:
    """``a·x + y`` over sparse ``(id, val)`` tables (full outer union-sum)."""
    ax = x.select("id", (F.lit(float(a)) * F.col("val")).alias("val"))
    return ax.unionByName(y).groupBy("id").agg(F.sum("val").alias("val"))
