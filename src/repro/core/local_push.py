"""Algorithm 3 — local deterministic exploitation for ``D(k,k)``.

The first-meeting decomposition ``D(k,k) = 1 − Σ_ℓ Z_ℓ(k)`` (eq. 12) lets us
compute the head ``Σ_{ℓ<=ℓ(k)} Z_ℓ(k)`` *exactly* via the Lemma-4 recursion

    Z_ℓ(k,q) = c^ℓ M^ℓ(k,q)² − Σ_{t=1}^{ℓ-1} Σ_{q'} c^{ℓ-t} M^{ℓ-t}(q',q)² Z_t(k,q')

(``M = Pᵀ`` is the walk transition matrix; ``M^t(q',·)`` rows are grown by
sparse breadth-first expansion), and estimate only the tail
``Σ_{ℓ>ℓ(k)} Z_ℓ(k) = c^{ℓ(k)}·Pr[survive ℓ(k) un-met ∧ √c-continuations
meet]`` with the non-stop pair walks from ``walks.pair_walks``.

``ℓ(k)`` is chosen adaptively: expansion stops once the traversed-edge
counter ``E_k`` exceeds ``2R(k)/√c`` — the expected edge cost of simulating
the ``R(k)`` pairs — exactly Algorithm 3's budget rule.  Because the tail is
deterministically bounded by ``c^{ℓ(k)}``, a node whose head went deep enough
(``c^{ℓ(k)} <= skip_tol``) skips sampling entirely; on the lite graphs this is
what lets optimized ExactSim reach ε = 1e-7 genuinely (DESIGN.md §4).

The driver parallelizes *across nodes* with ``mapInPandas`` + the broadcast
CSR graph, grouping nodes with similar ``R(k)`` per partition — the paper's
own parallelization prescription (§3.2 "Parallelization").
"""
from __future__ import annotations

import math
from dataclasses import dataclass
from typing import Dict, Iterator, Tuple

import numpy as np
import pandas as pd

from repro.graphs.graph import CSRGraph, Graph
from repro.linalg import matvec as mv
from repro.walks.pair_walks import pair_meet_count

#: Entries below this magnitude are dropped from sparse rows/Z vectors during
#: expansion.  Introduces error << 1e-10 per node — far below ε_min — while
#: keeping supports from exploding on dense graphs.
PRUNE = 1e-15

#: Hard cap on the deterministic depth; c^40 ≈ 1e-9 so deeper heads cannot
#: change the 1e-7 digit.
MAX_LEVEL = 40

SparseVec = Tuple[np.ndarray, np.ndarray]  # (indices int64, values float64)


def _expand(csr: CSRGraph, row: SparseVec) -> Tuple[SparseVec, int]:
    """One step of ``M``: distribute each entry to its node's in-neighbors.

    Returns the new row and the number of edges traversed (the ``E_k``
    increment).  Entries at dead-end nodes vanish (the walk must stop there).
    Delegates to the shared local-push primitive (``M^t`` rows are exactly
    sparse ``P``-matvecs because ``P = Mᵀ``).
    """
    idx, val, total = mv.expand_sparse(csr, row[0], row[1], prune=PRUNE)
    return (idx, val), total


RowKey = Tuple[int, int]  # (origin node q, level t) identifying an M^t(q,·) row


def _expand_batch(
    csr: CSRGraph, rows: Dict[RowKey, SparseVec]
) -> Tuple[Dict[RowKey, SparseVec], int]:
    """Advance every row one level in a single vectorized push.

    All rows' entries are concatenated, pushed along the reversed edges at
    once, and re-aggregated per row via a composite ``(row, node)`` key —
    identical arithmetic to per-row :func:`_expand`, but one numpy pass per
    level instead of one per row, which is what makes deep heads affordable.
    """
    keys = list(rows)
    sizes = np.array([rows[key][0].size for key in keys], dtype=np.int64)
    rid = np.repeat(np.arange(len(keys)), sizes)
    idx = np.concatenate([rows[key][0] for key in keys]) if keys else np.zeros(0, np.int64)
    val = np.concatenate([rows[key][1] for key in keys]) if keys else np.zeros(0)
    keep = csr.din[idx] > 0
    rid, idx, val = rid[keep], idx[keep], val[keep]
    out: Dict[RowKey, SparseVec] = {
        (q, lvl + 1): (np.zeros(0, np.int64), np.zeros(0)) for (q, lvl) in keys
    }
    if idx.size == 0:
        return out, 0
    counts = csr.din[idx]
    total = int(counts.sum())
    rep = np.repeat(np.arange(idx.size), counts)
    offsets = np.arange(total) - np.repeat(np.cumsum(counts) - counts, counts)
    nbr = csr.in_neighbors[csr.in_indptr[idx][rep] + offsets]
    w = (val / counts)[rep]
    key = rid[rep] * csr.n + nbr
    uk, inv = np.unique(key, return_inverse=True)
    acc = np.bincount(inv, weights=w, minlength=uk.size)
    keep2 = acc > PRUNE
    uk, acc = uk[keep2], acc[keep2]
    out_rid = uk // csr.n
    out_nbr = uk % csr.n
    bounds = np.searchsorted(out_rid, np.arange(len(keys) + 1))
    for i, (q, lvl) in enumerate(keys):
        s, e = bounds[i], bounds[i + 1]
        out[(q, lvl + 1)] = (out_nbr[s:e], acc[s:e])
    return out, total


@dataclass
class HeadResult:
    """Deterministic head of the first-meeting series for one node."""

    node: int
    ell: int  # ℓ(k): levels computed exactly
    z_sum: float  # Σ_{ℓ<=ℓ(k)} Z_ℓ(k)
    edges: int  # E_k actually traversed


def meeting_head(
    csr: CSRGraph, k: int, *, c: float, budget_edges: int, max_level: int = MAX_LEVEL
) -> HeadResult:
    """Exact ``Σ_{ℓ<=ℓ(k)} Z_ℓ(k)`` with adaptive depth under an edge budget.

    Invariant: entering iteration ℓ, ``rows`` holds exactly the ``M^t(q,·)``
    rows needed to advance this level — ``(k, ℓ-1)`` plus ``(q', ℓ-1-t)`` for
    every ``q' ∈ supp Z_t`` — each of which moves up one level per iteration
    (so the batched expansion is a single vectorized pass).  The traversal
    cost of a level is known *before* paying it (sum of in-degrees over all
    row entries), so the budget check aborts a level without partial work,
    mirroring Algorithm 3's ``E_k`` counter at level granularity.
    """
    rows: Dict[RowKey, SparseVec] = {
        (k, 0): (np.array([k], dtype=np.int64), np.ones(1))
    }
    z: Dict[int, SparseVec] = {}  # t -> Z_t(k, ·)
    z_sum = 0.0
    edges = 0
    ell_done = 0
    for ell in range(1, max_level + 1):
        # Cost of this level, computed before committing to it.
        cost = sum(
            int(csr.din[idx].sum()) for idx, _ in rows.values()
        )
        if edges + cost > budget_edges:
            break  # unaffordable level: ℓ(k) stays at ell-1 (0 ⇒ Algorithm 2)
        new_rows, actual = _expand_batch(csr, rows)
        edges += actual
        # Rows that died out (dead ends / pruned away) need no further work.
        new_rows = {key: row for key, row in new_rows.items() if row[0].size}
        empty = (np.zeros(0, np.int64), np.zeros(0))
        # --- Lemma 4 at this level. ---
        ki, kv = new_rows.get((k, ell), empty)
        acc_idx = [ki]
        acc_val = [(c**ell) * kv**2]
        for t in range(1, ell):
            zi, zv = z[t]
            for pos, q in enumerate(zi.tolist()):
                ri, rv = new_rows.get((q, ell - t), empty)
                if ri.size:
                    acc_idx.append(ri)
                    acc_val.append(-(c ** (ell - t)) * rv**2 * zv[pos])
        all_idx = np.concatenate(acc_idx)
        all_val = np.concatenate(acc_val)
        uniq, inv = np.unique(all_idx, return_inverse=True)
        zl = np.bincount(inv, weights=all_val, minlength=uniq.size)
        keep = np.abs(zl) > PRUNE
        z[ell] = (uniq[keep], zl[keep])
        z_sum += float(zl[keep].sum())
        ell_done = ell
        # Next iteration advances the surviving rows plus fresh base rows for
        # this level's first-meeting nodes.
        rows = new_rows
        for q in z[ell][0].tolist():
            rows[(q, 0)] = (np.array([q], dtype=np.int64), np.ones(1))
        if c**ell < PRUNE or not rows:
            break
    return HeadResult(node=k, ell=ell_done, z_sum=z_sum, edges=edges)


def estimate_node(
    csr: CSRGraph,
    k: int,
    r_k: int,
    *,
    c: float,
    rng: np.random.Generator,
    skip_tol: float = 0.0,
) -> Tuple[float, int, int]:
    """Full Algorithm 3 for one node: head + sampled tail.

    Returns ``(D̂(k,k), ℓ(k), pairs actually simulated)``.  Trivial in-degree
    cases short-circuit (lines 1-4).  If the tail bound ``c^{ℓ(k)}`` is below
    ``skip_tol`` the sampling step is skipped — the estimate is then
    deterministic with error <= ``c^{ℓ(k)}``.

    The tail sample count is scaled down to ``R'(k) = ⌈c^{ℓ(k)} R(k)⌉``: the
    tail estimator's values live in ``{0, c^{ℓ(k)}}``, so its variance is
    ``c^{2ℓ(k)} q(1-q)/R' <= c^{ℓ(k)}/(4R(k)) <= 1/(4R(k))`` — never worse
    than Algorithm 2 at the full ``R(k)``.  This is how the paper's "reduces
    the variance by at least ``c^{ℓ(k)}``" claim turns into wall-clock
    savings (Figure 9's 10-100×) rather than only accuracy.
    """
    din = int(csr.din[k])
    if din == 0:
        return 1.0, 0, 0
    if din == 1:
        return 1.0 - c, 0, 0
    budget = int(math.ceil(2.0 * r_k / math.sqrt(c)))
    head = meeting_head(csr, k, c=c, budget_edges=budget)
    d_hat = 1.0 - head.z_sum
    if c**head.ell <= skip_tol:
        return d_hat, head.ell, 0
    r_sim = int(math.ceil(r_k * c**head.ell))
    met = pair_meet_count(csr, k, r_sim, c=c, rng=rng, nonstop_steps=head.ell)
    d_hat -= (c**head.ell) * met / max(r_sim, 1)
    return d_hat, head.ell, r_sim


# ---------------------------------------------------------------------------
# Distributed driver
# ---------------------------------------------------------------------------


def estimate_D_local_push(
    graph: Graph,
    nodes: np.ndarray,
    counts: np.ndarray,
    *,
    c: float,
    seed: int,
    skip_tol: float = 0.0,
    engine: str = "local",
    default: float | None = None,
) -> Tuple[np.ndarray, pd.DataFrame]:
    """Estimate ``D̂`` for the given nodes with Algorithm 3.

    Returns the dense ``D̂`` vector plus a per-node stats frame
    ``(node, d_hat, ell, pairs)``.  The Spark engine partitions nodes sorted
    by ``R(k)`` so tasks carry similar budgets (the paper's load-balancing
    rule); seeds are per-node so both engines agree exactly.
    """
    order = np.argsort(counts, kind="stable")[::-1]
    nodes, counts = nodes[order], counts[order]
    work = pd.DataFrame(
        {
            "node": nodes.astype(np.int64),
            "r_k": counts.astype(np.int64),
            "seed": ((seed * 1_000_003 + nodes) & 0x7FFFFFFF).astype(np.int64),
        }
    )

    def run_chunk(csr: CSRGraph, pdf: pd.DataFrame) -> pd.DataFrame:
        out = []
        for row in pdf.itertuples(index=False):
            rng = np.random.default_rng(int(row.seed))
            d_hat, ell, pairs = estimate_node(
                csr, int(row.node), int(row.r_k), c=c, rng=rng, skip_tol=skip_tol
            )
            out.append((int(row.node), d_hat, ell, pairs))
        return pd.DataFrame(out, columns=["node", "d_hat", "ell", "pairs"])

    if engine == "spark":
        bc = graph.broadcast_csr()
        spark = graph.spark
        par = max(2, spark.sparkContext.defaultParallelism)
        # Round-robin by budget rank → partitions hold similar R(k) mixes.
        work = work.assign(part=np.arange(len(work)) % par)
        wdf = spark.createDataFrame(work, schema="node long, r_k long, seed long, part long")
        wdf = wdf.repartition(par, "part")

        def run(batches: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
            csr = bc.value
            for pdf in batches:
                yield run_chunk(csr, pdf)

        stats = (
            wdf.mapInPandas(run, schema="node long, d_hat double, ell long, pairs long")
            .toPandas()
            .sort_values("node")
            .reset_index(drop=True)
        )
    else:
        stats = (
            run_chunk(graph.csr, work).sort_values("node").reset_index(drop=True)
        )
    d = np.full(graph.n, (1.0 - c) if default is None else default)
    d[stats["node"].to_numpy()] = stats["d_hat"].to_numpy()
    return d, stats
