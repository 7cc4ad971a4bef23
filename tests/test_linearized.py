"""Linearized engine: forward/backward phases, Lemma-2 sparsification, DF parity."""
import math

import numpy as np
import pytest

from repro.core import linearized
from tests.helpers import exact_d, power_truth
from repro.graphs import generators as gen

C = 0.6
SQC = math.sqrt(C)


def test_iterations_for_bound():
    for eps in [1e-2, 1e-5, 1e-7]:
        L = linearized.iterations_for(eps, C)
        assert C**L <= eps / 2
        assert C ** (L - 1) > eps / 2 or L == 1


def test_sparse_threshold_formula():
    assert linearized.sparse_threshold(1e-3, C) == pytest.approx(
        (1 - SQC) ** 2 * 1e-3
    )


@pytest.mark.parametrize("name", gen.SMALL_DATASETS)
def test_forward_hop_vectors_match_dense(name):
    g = gen.load(name)
    fwd = linearized.forward(g.csr, 0, c=C, L=6)
    P = g.dense_P()
    e0 = np.zeros(g.n)
    e0[0] = 1.0
    expect = (1 - SQC) * e0
    for ell in range(7):
        np.testing.assert_allclose(fwd.pis[ell], expect, atol=1e-12)
        expect = SQC * (P @ expect)
    np.testing.assert_allclose(fwd.pi, np.sum(fwd.pis, axis=0), atol=1e-12)


def test_forward_mass_on_cycle():
    # No dead ends: Σ_ℓ Σ_k π^ℓ(k) = 1 - (√c)^{L+1} exactly.
    g = gen.tiny_cycle(5)
    fwd = linearized.forward(g.csr, 0, c=C, L=10)
    assert fwd.pi.sum() == pytest.approx(1 - SQC**11, abs=1e-12)


@pytest.mark.parametrize("name", gen.SMALL_DATASETS)
@pytest.mark.parametrize("source", [0, 7])
def test_linearized_with_exact_D_matches_power_method(name, source):
    """The paper's central identity (eq. 3/8): linearization with the true D
    reproduces SimRank exactly (up to truncation c^L)."""
    g = gen.load(name)
    S = power_truth(name)
    d = exact_d(name)
    s, _ = linearized.single_source(g.csr, source, d, c=C, eps=1e-8)
    assert np.abs(s - S[:, source]).max() < 1e-7


@pytest.mark.parametrize("eps", [1e-2, 1e-4])
def test_sparse_linearization_error_bound(eps):
    """Lemma 2: sparsification adds at most ε extra error."""
    g = gen.load("GQ-lite")
    d = exact_d("GQ-lite")
    L = linearized.iterations_for(eps, C)
    dense, _ = linearized.single_source(g.csr, 0, d, c=C, eps=eps, sparse=False, L=L)
    sparse, fwd = linearized.single_source(g.csr, 0, d, c=C, eps=eps, sparse=True, L=L)
    assert np.abs(dense - sparse).max() <= eps
    assert fwd.threshold > 0


def test_sparse_reduces_stored_entries():
    g = gen.load("HP-lite")
    d = np.full(g.n, 1 - C)
    _, fwd_dense = linearized.single_source(g.csr, 0, d, c=C, eps=1e-3)
    _, fwd_sparse = linearized.single_source(g.csr, 0, d, c=C, eps=1e-3, sparse=True)
    assert fwd_sparse.stored_entries < fwd_dense.stored_entries
    assert fwd_sparse.sparse_bytes() < fwd_dense.dense_bytes()


def test_forward_result_accounting():
    g = gen.tiny_cycle(4)
    fwd = linearized.forward(g.csr, 0, c=C, L=5)
    # On a cycle each hop vector has exactly one nonzero entry.
    assert fwd.stored_entries == 6
    assert fwd.L == 5
    assert fwd.dense_bytes() == 6 * 4 * 8
    assert fwd.sparse_bytes() == 6 * 16


def test_backward_cycle_closed_form():
    """Directed cycle: S·e_0 = e_0, and with D = (1-c)I the linearized
    backward phase reproduces it exactly."""
    g = gen.tiny_cycle(5)
    d = np.full(5, 1 - C)
    s, _ = linearized.single_source(g.csr, 0, d, c=C, eps=1e-9)
    truth = np.zeros(5)
    truth[0] = 1.0
    np.testing.assert_allclose(s, truth, atol=1e-8)


def test_forward_sparse_levels_match_dense_forward():
    g = gen.load("WV-lite")
    eps = 1e-3
    L = linearized.iterations_for(eps, C)
    thr = linearized.sparse_threshold(eps, C)
    fwd = linearized.forward(g.csr, 3, c=C, L=L, threshold=thr)
    levels, entries, edges = linearized.forward_sparse_levels(
        g.csr, 3, c=C, L=L, threshold=thr
    )
    assert entries == fwd.stored_entries
    assert edges > 0
    for ell, (idx, val) in enumerate(levels):
        dense = np.zeros(g.n)
        dense[idx] = val
        np.testing.assert_allclose(dense, fwd.pis[ell], atol=1e-12)


# ---------------------------------------------------------------------------
# Spark DataFrame engine parity
# ---------------------------------------------------------------------------


@pytest.mark.parametrize("g", [gen.tiny_cycle(5), gen.tiny_star(4)], ids=lambda g: g.name)
def test_forward_df_matches_numpy(spark, g):
    g.spark = spark
    fwd = linearized.forward(g.csr, 0, c=C, L=4)
    pis_df = linearized.forward_df(g, 0, c=C, L=4)
    for a, b in zip(fwd.pis, pis_df):
        np.testing.assert_allclose(a, b, atol=1e-10)


def test_backward_df_matches_numpy(spark):
    g = gen.load("GQ-lite", spark)
    d = exact_d("GQ-lite")
    fwd = linearized.forward(g.csr, 0, c=C, L=5)
    s_np = linearized.backward(g.csr, fwd, d, c=C)
    s_df = linearized.backward_df(g, fwd.pis, d, c=C)
    np.testing.assert_allclose(s_df, s_np, atol=1e-9)


def test_full_query_df_engine_matches_power(spark):
    """End-to-end single-source on the DataFrame engine with exact D."""
    g = gen.load("GQ-lite", spark)
    S = power_truth("GQ-lite")
    d = exact_d("GQ-lite")
    L = linearized.iterations_for(1e-5, C)
    pis = linearized.forward_df(g, 0, c=C, L=L)
    s = linearized.backward_df(g, pis, d, c=C)
    assert np.abs(s - S[:, 0]).max() < 1e-4
