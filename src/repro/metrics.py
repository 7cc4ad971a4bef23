"""Evaluation metrics from §4 of the paper: MaxError and Precision@k.

Given a source ``v_i``, an estimated single-source vector ``ŝ`` and the
ground truth ``s``:

* ``MaxError = max_j |ŝ(j) − s(j)|``;
* ``Precision@k`` = fraction of the estimated top-k that appears in the true
  top-k.  The source itself is excluded (its similarity is identically 1 for
  every method, so including it would only inflate all precisions equally);
  ties at the k-th true value are broken by node id on both sides, which
  keeps the metric deterministic.
"""
from __future__ import annotations

import numpy as np


def max_error(est: np.ndarray, truth: np.ndarray) -> float:
    """Maximum absolute deviation over all n similarities."""
    if est.shape != truth.shape:
        raise ValueError("shape mismatch")
    return float(np.max(np.abs(est - truth)))


def top_k(scores: np.ndarray, k: int, *, exclude: int) -> np.ndarray:
    """Top-k node ids by score, excluding ``exclude``, ties broken by id."""
    order = np.lexsort((np.arange(scores.shape[0]), -scores))
    order = order[order != exclude]
    return order[:k]


def precision_at_k(
    est: np.ndarray, truth: np.ndarray, k: int, *, source: int
) -> float:
    """|top-k(est) ∩ top-k(truth)| / k, source excluded on both sides."""
    if est.shape != truth.shape:
        raise ValueError("shape mismatch")
    k = min(k, est.shape[0] - 1)
    if k <= 0:
        return 1.0
    a = set(top_k(est, k, exclude=source).tolist())
    b = set(top_k(truth, k, exclude=source).tolist())
    return len(a & b) / k
