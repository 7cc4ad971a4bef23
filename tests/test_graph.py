"""Graph substrate: CSR construction, transition matrix, Spark/oracle parity."""
import numpy as np
import pytest
from pyspark.sql import functions as F

from repro.graphs import generators as gen
from repro.graphs.graph import build_csr, from_edges
from repro.oracle import assert_equivalent

SMALL = gen.SMALL_DATASETS


# ---------------------------------------------------------------------------
# CSR construction and validation
# ---------------------------------------------------------------------------


def test_build_csr_rejects_self_loop():
    with pytest.raises(ValueError, match="self-loop"):
        build_csr(3, np.array([0, 1]), np.array([1, 1]))


def test_build_csr_rejects_duplicate_edges():
    with pytest.raises(ValueError, match="duplicate"):
        build_csr(3, np.array([0, 0]), np.array([1, 1]))


def test_build_csr_rejects_out_of_range():
    with pytest.raises(ValueError, match="out of range"):
        build_csr(2, np.array([0]), np.array([5]))


def test_build_csr_rejects_length_mismatch():
    with pytest.raises(ValueError, match="mismatch"):
        build_csr(3, np.array([0, 1]), np.array([1]))


def test_csr_empty_graph():
    csr = build_csr(4, np.zeros(0, dtype=np.int64), np.zeros(0, dtype=np.int64))
    assert csr.m == 0
    assert csr.din.tolist() == [0, 0, 0, 0]
    assert csr.in_neigh(2).size == 0


@pytest.mark.parametrize("name", SMALL)
def test_csr_in_degree_consistency(name):
    g = gen.load(name)
    csr = g.csr
    assert csr.din.sum() == csr.m
    assert csr.in_indptr[-1] == csr.m
    recomputed = np.bincount(csr.dst, minlength=csr.n)
    np.testing.assert_array_equal(csr.din, recomputed)


@pytest.mark.parametrize("name", SMALL)
def test_csr_in_neighbors_match_edges(name):
    g = gen.load(name)
    csr = g.csr
    # Every CSR slice must hold exactly the sources of edges into that node.
    rng = np.random.default_rng(0)
    for v in rng.choice(g.n, size=20, replace=False):
        expected = sorted(csr.src[csr.dst == v].tolist())
        assert sorted(csr.in_neigh(int(v)).tolist()) == expected


@pytest.mark.parametrize("name", SMALL)
def test_edge_bytes_formula(name):
    g = gen.load(name)
    assert g.csr.edge_bytes() == 16 * g.m


@pytest.mark.parametrize("name", ["GQ-lite", "HT-lite", "HP-lite"])
def test_undirected_graphs_are_symmetric(name):
    g = gen.load(name)
    assert not g.directed
    fwd = set(zip(g.csr.src.tolist(), g.csr.dst.tolist()))
    assert all((d, s) in fwd for s, d in fwd)


def test_dense_P_column_stochastic():
    g = gen.load("GQ-lite")
    P = g.dense_P()
    sums = P.sum(axis=0)
    has_in = g.csr.din > 0
    np.testing.assert_allclose(sums[has_in], 1.0, atol=1e-12)
    np.testing.assert_allclose(sums[~has_in], 0.0, atol=0)


def test_dense_P_entries_match_definition():
    g = gen.tiny_star(3)
    P = g.dense_P()
    # Leaves have in-degree 1 (the center); center has in-degree 3.
    for leaf in (1, 2, 3):
        assert P[0, leaf] == 1.0  # P(center, leaf) = 1/d_in(leaf)
        assert P[leaf, 0] == pytest.approx(1.0 / 3.0)


def test_dense_P_guard_on_large_graph():
    g = gen.load("DB-lite")
    with pytest.raises(ValueError, match="small-graph"):
        g.dense_P()


# ---------------------------------------------------------------------------
# Spark views + DuckDB oracle
# ---------------------------------------------------------------------------


@pytest.mark.parametrize("name", ["GQ-lite", "WV-lite"])
def test_edges_df_matches_pandas(spark, name):
    g = gen.load(name, spark)
    assert g.edges_df().count() == g.m
    got = g.edges_df().toPandas().sort_values(["src", "dst"]).reset_index(drop=True)
    exp = g.edges_pdf().sort_values(["src", "dst"]).reset_index(drop=True)
    assert got.equals(exp)


@pytest.mark.parametrize("name", ["GQ-lite", "WV-lite"])
def test_transition_df_oracle(spark, name):
    g = gen.load(name, spark)
    assert_equivalent(
        g.transition_df(),
        """
        SELECT e.src AS src, e.dst AS dst, 1.0 / d.din AS w
        FROM edges e
        JOIN (SELECT dst, COUNT(*) AS din FROM edges GROUP BY dst) d
          ON e.dst = d.dst
        """,
        edges=g.edges_pdf(),
    )


def test_transition_df_weights_sum_to_one(spark):
    g = gen.load("GQ-lite", spark)
    sums = (
        g.transition_df()
        .groupBy("dst")
        .agg(F.sum("w").alias("s"))
        .toPandas()["s"]
        .to_numpy()
    )
    np.testing.assert_allclose(sums, 1.0, atol=1e-12)


def test_indegree_oracle(spark):
    g = gen.load("HT-lite", spark)
    din_df = g.edges_df().groupBy("dst").agg(F.count("*").alias("din"))
    assert_equivalent(
        din_df,
        "SELECT dst, COUNT(*) AS din FROM edges GROUP BY dst",
        edges=g.edges_pdf(),
    )


def test_graph_without_spark_session_raises():
    g = from_edges("t", 3, np.array([0]), np.array([1]), directed=True)
    with pytest.raises(RuntimeError, match="SparkSession"):
        g.edges_df()
