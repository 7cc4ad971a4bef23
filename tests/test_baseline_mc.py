"""MC baseline: estimator correctness, engines, the oracle-replayed join."""
import numpy as np

from repro.baselines import mc
from repro.graphs import generators as gen
from repro.oracle import assert_equivalent
from tests.helpers import power_truth

C = 0.6


def test_mc_estimates_cycle_exactly_zero():
    # On a directed cycle S(i,j)=0 for i != j and walks from different
    # starts can never collide (positions differ by a constant offset).
    g = gen.tiny_cycle(6)
    idx = mc.preprocess(g, r_per_node=200, c=C, seed=1)
    res = mc.query_local(g, idx, 0)
    truth = np.zeros(6)
    truth[0] = 1.0
    np.testing.assert_array_equal(res.scores, truth)


def test_mc_close_to_truth_on_star():
    g = gen.tiny_star(4)
    from repro.baselines.power_method import simrank_power

    S = simrank_power(g, c=C, tol=1e-12)
    idx = mc.preprocess(g, r_per_node=20_000, c=C, seed=2)
    res = mc.query_local(g, idx, 1)
    # Binomial std at R=2e4 ≈ 0.0035; 5σ.
    np.testing.assert_allclose(res.scores, S[:, 1], atol=0.02)


def test_mc_error_shrinks_with_r():
    g = gen.load("GQ-lite")
    S = power_truth("GQ-lite")
    errs = []
    for r_per_node in (20, 500):
        idx = mc.preprocess(g, r_per_node=r_per_node, c=C, seed=3)
        res = mc.query_local(g, idx, 0)
        errs.append(np.abs(res.scores - S[:, 0]).max())
    assert errs[1] < errs[0]


def test_mc_index_accounting():
    g = gen.load("GQ-lite")
    idx = mc.preprocess(g, r_per_node=5, c=C, seed=4)
    assert idx.rows == len(idx.trace_pdf)
    assert idx.index_bytes() == 32 * idx.rows
    assert idx.seconds_preprocess > 0


def test_mc_spark_query_matches_local(spark):
    g = gen.load("GQ-lite", spark)
    idx_local = mc.preprocess(g, r_per_node=50, c=C, seed=5, engine="local")
    idx_spark = mc.preprocess(g, r_per_node=50, c=C, seed=5, engine="spark")
    a = mc.query_local(g, idx_local, 7)
    b = mc.query_spark(g, idx_spark, 7)
    np.testing.assert_allclose(a.scores, b.scores, atol=1e-12)


def test_mc_query_oracle(spark):
    """Replay the meeting-count join in DuckDB over the same trace table."""
    g = gen.load("GQ-lite", spark)
    idx = mc.preprocess(g, r_per_node=20, c=C, seed=6, engine="spark")
    source = 7
    from pyspark.sql import functions as F

    t = idx.trace_df
    ti = t.filter(F.col("node") == source).select("r", "step", "pos")
    counts = (
        t.filter(F.col("node") != source)
        .join(ti, ["r", "step", "pos"])
        .select("node", "r")
        .distinct()
        .groupBy("node")
        .agg(F.count("*").alias("meets"))
    )
    assert_equivalent(
        counts,
        f"""
        SELECT t.node AS node, COUNT(DISTINCT t.r) AS meets
        FROM traces t
        JOIN (SELECT r, step, pos FROM traces WHERE node = {source}) s
          ON t.r = s.r AND t.step = s.step AND t.pos = s.pos
        WHERE t.node <> {source}
        GROUP BY t.node
        """,
        traces=idx.trace_df.toPandas(),
    )
