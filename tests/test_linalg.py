"""Mat-vec engines: numpy kernels vs dense reference vs Spark vs DuckDB."""
import numpy as np
import pandas as pd
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.graphs import generators as gen
from repro.linalg import matvec as mv
from repro.oracle import assert_equivalent

SMALL = gen.SMALL_DATASETS


def _rand_vec(n, seed):
    return np.random.default_rng(seed).random(n)


# ---------------------------------------------------------------------------
# numpy kernels vs dense reference
# ---------------------------------------------------------------------------


@pytest.mark.parametrize("name", SMALL)
@pytest.mark.parametrize("seed", [0, 1])
def test_matvec_P_matches_dense(name, seed):
    g = gen.load(name)
    v = _rand_vec(g.n, seed)
    np.testing.assert_allclose(
        mv.matvec_P(g.csr, v), g.dense_P() @ v, atol=1e-12
    )


@pytest.mark.parametrize("name", SMALL)
@pytest.mark.parametrize("seed", [0, 1])
def test_matvec_PT_matches_dense(name, seed):
    g = gen.load(name)
    v = _rand_vec(g.n, seed)
    np.testing.assert_allclose(
        mv.matvec_PT(g.csr, v), g.dense_P().T @ v, atol=1e-12
    )


def test_matvec_rejects_wrong_length():
    g = gen.tiny_cycle(4)
    with pytest.raises(ValueError, match="length"):
        mv.matvec_P(g.csr, np.ones(5))
    with pytest.raises(ValueError, match="length"):
        mv.matvec_PT(g.csr, np.ones(5))


def test_matvec_linearity():
    g = gen.load("GQ-lite")
    x, y = _rand_vec(g.n, 1), _rand_vec(g.n, 2)
    np.testing.assert_allclose(
        mv.matvec_P(g.csr, 2.0 * x + y),
        2.0 * mv.matvec_P(g.csr, x) + mv.matvec_P(g.csr, y),
        atol=1e-12,
    )


def test_matvec_preserves_mass_without_dead_ends():
    # P is column-stochastic when every node has in-degree > 0, so Pᵀ·v
    # preserves total mass (the walk distribution never leaks).
    g = gen.tiny_cycle(7)
    v = _rand_vec(g.n, 3)
    assert mv.matvec_PT(g.csr, v).sum() == pytest.approx(v.sum())


@given(st.integers(min_value=0, max_value=2**31 - 1))
@settings(max_examples=15, deadline=None)
def test_matvec_PT_mass_property(seed):
    g = gen.tiny_cycle(5)
    v = np.random.default_rng(seed).random(5)
    assert mv.matvec_PT(g.csr, v).sum() == pytest.approx(v.sum())


# ---------------------------------------------------------------------------
# sparse local-push expansion
# ---------------------------------------------------------------------------


@pytest.mark.parametrize("name", SMALL)
def test_expand_sparse_equals_matvec(name):
    g = gen.load(name)
    v = np.zeros(g.n)
    rng = np.random.default_rng(5)
    nz = rng.choice(g.n, size=10, replace=False)
    v[nz] = rng.random(10)
    idx, val, edges = mv.expand_sparse(g.csr, nz.astype(np.int64), v[nz])
    dense = mv.matvec_P(g.csr, v)
    out = np.zeros(g.n)
    out[idx] = val
    np.testing.assert_allclose(out, dense, atol=1e-12)
    assert edges == int(g.csr.din[nz].sum())


def test_expand_sparse_prunes():
    g = gen.tiny_star(3)
    # Mass at the center spreads 1/3 to each leaf; prune above that drops all.
    idx, val, _ = mv.expand_sparse(
        g.csr, np.array([0], dtype=np.int64), np.array([1.0]), prune=0.5
    )
    assert idx.size == 0
    assert val.size == 0


def test_expand_sparse_dead_end():
    # Node 1 has no in-neighbors: mass there evaporates.
    from repro.graphs.graph import from_edges

    g = from_edges("dead", 2, np.array([1]), np.array([0]), directed=True)
    idx, val, edges = mv.expand_sparse(
        g.csr, np.array([0], dtype=np.int64), np.array([1.0])
    )
    assert idx.tolist() == [1] and val.tolist() == [1.0]
    idx2, _, edges2 = mv.expand_sparse(g.csr, idx, val)
    assert idx2.size == 0 and edges2 == 0


# ---------------------------------------------------------------------------
# Spark DataFrame engine + oracle
# ---------------------------------------------------------------------------


@pytest.mark.parametrize("name", ["GQ-lite", "WV-lite"])
def test_matvec_P_df_matches_numpy(spark, name):
    g = gen.load(name, spark)
    v = _rand_vec(g.n, 7)
    got = mv.df_to_vec(g.n, mv.matvec_P_df(g.transition_df(), mv.vec_to_df(g, v)))
    np.testing.assert_allclose(got, mv.matvec_P(g.csr, v), atol=1e-9)


@pytest.mark.parametrize("name", ["GQ-lite", "WV-lite"])
def test_matvec_PT_df_matches_numpy(spark, name):
    g = gen.load(name, spark)
    v = _rand_vec(g.n, 8)
    got = mv.df_to_vec(g.n, mv.matvec_PT_df(g.transition_df(), mv.vec_to_df(g, v)))
    np.testing.assert_allclose(got, mv.matvec_PT(g.csr, v), atol=1e-9)


def test_matvec_df_oracle(spark):
    """The message-passing join IS a SQL query — let DuckDB replay it."""
    g = gen.load("GQ-lite", spark)
    v = _rand_vec(g.n, 9)
    vec_pdf = pd.DataFrame({"id": np.arange(g.n), "val": v})
    trans_pdf = g.transition_df().toPandas()
    out_df = mv.matvec_P_df(g.transition_df(), mv.vec_to_df(g, v))
    assert_equivalent(
        out_df,
        """
        SELECT t.src AS id, SUM(t.w * v.val) AS val
        FROM transition t JOIN vec v ON t.dst = v.id
        GROUP BY t.src
        """,
        transition=trans_pdf,
        vec=vec_pdf,
    )


def test_axpy_df(spark):
    g = gen.load("GQ-lite", spark)
    x, y = _rand_vec(g.n, 10), _rand_vec(g.n, 11)
    got = mv.df_to_vec(
        g.n, mv.axpy_df(0.5, mv.vec_to_df(g, x), mv.vec_to_df(g, y))
    )
    np.testing.assert_allclose(got, 0.5 * x + y, atol=1e-12)


def test_vec_df_roundtrip(spark):
    g = gen.load("GQ-lite", spark)
    v = np.zeros(g.n)
    v[[3, 77, 400]] = [0.25, -1.5, 3.0]
    np.testing.assert_array_equal(mv.df_to_vec(g.n, mv.vec_to_df(g, v)), v)
