"""Spark engine ≡ local engine, peel-for-peel, plus DuckDB oracle checks
on the engine's internal aggregations."""
import numpy as np
import pandas as pd
import pytest

from repro.core import DG, DW, FD, TDS, from_edges, kclids, peel_local, peel_spark
from repro.core.schedules import bucket, dupin, gpo, lpo, sequential
from repro.core.spark_engine import cliques_df, edge_weights_df
from repro.oracle import assert_equivalent


def _graph(seed, n=36, m=110):
    rng = np.random.default_rng(seed)
    return from_edges(
        n, rng.integers(0, n, m), rng.integers(0, n, m),
        rng.random(m) * 3 + 0.1, vertex_weight=rng.random(n) * 0.3,
    )


def _assert_same(rl, rs):
    assert rs.best_density == pytest.approx(rl.best_density, abs=1e-7)
    assert np.array_equal(np.sort(rl.best_set), np.sort(rs.best_set))
    assert rl.n_rounds == rs.n_rounds
    assert len(rl.round_sets) == len(rs.round_sets)
    for a, b in zip(rl.round_sets, rs.round_sets):
        assert np.array_equal(np.sort(a), b)


@pytest.mark.parametrize("metric", [DW, DG, FD], ids=lambda m: m.name)
def test_spark_matches_local_dupin(spark, metric):
    g = _graph(1)
    rl = peel_local(g, metric, dupin(0.1), collect_round_sets=True)
    rs = peel_spark(spark, g, metric, dupin(0.1), collect_round_sets=True)
    _assert_same(rl, rs)


@pytest.mark.parametrize("sched_name,sched", [
    ("gpo", gpo(0.1)), ("lpo", lpo(0.1)), ("bucket", bucket()),
])
def test_spark_matches_local_schedules(spark, sched_name, sched):
    g = _graph(2, n=24, m=70)
    rl = peel_local(g, DW, sched, collect_round_sets=True)
    rs = peel_spark(spark, g, DW, sched, collect_round_sets=True)
    _assert_same(rl, rs)


def test_spark_matches_local_tds(spark):
    g = _graph(3, n=26, m=90)
    rl = peel_local(g, TDS, dupin(0.1), collect_round_sets=True)
    rs = peel_spark(spark, g, TDS, dupin(0.1), collect_round_sets=True)
    _assert_same(rl, rs)


def test_spark_matches_local_kclids4(spark):
    g = _graph(4, n=20, m=70)
    rl = peel_local(g, kclids(4), dupin(0.1), collect_round_sets=True)
    rs = peel_spark(spark, g, kclids(4), dupin(0.1), collect_round_sets=True)
    _assert_same(rl, rs)


def test_spark_rejects_sequential(spark):
    g = _graph(5, n=8, m=12)
    with pytest.raises(ValueError, match="sequential"):
        peel_spark(spark, g, DG, sequential())


def test_spark_densities_match_local(spark):
    g = _graph(6, n=20, m=60)
    rl = peel_local(g, DW, dupin(0.1))
    rs = peel_spark(spark, g, DW, dupin(0.1))
    assert len(rl.densities) == len(rs.densities)
    for a, b in zip(rl.densities, rs.densities):
        assert b == pytest.approx(a, abs=1e-7)


# ---- oracle checks on the engine's internal aggregations ----------------

def test_edge_weights_df_oracle(spark):
    """The per-vertex weight aggregation equals the equivalent SQL."""
    g = _graph(7, n=18, m=50)
    ew = DW.build(g)
    verts = pd.DataFrame({"vid": np.arange(g.n), "a": ew.a})
    edges = pd.DataFrame({"src": g.src, "dst": g.dst, "c": ew.c})
    sdf = edge_weights_df(
        spark.createDataFrame(verts), spark.createDataFrame(edges)
    ).select("vid", "w")
    assert_equivalent(
        sdf,
        """
        SELECT v.vid AS vid,
               v.a + COALESCE(s.wsum, 0.0) AS w
        FROM verts v
        LEFT JOIN (
            SELECT src AS vid, SUM(c) AS wsum FROM (
                SELECT src, c FROM edges
                UNION ALL
                SELECT dst AS src, c FROM edges
            ) GROUP BY src
        ) s ON v.vid = s.vid
        """,
        verts=verts,
        edges=edges,
    )


def test_triangle_count_oracle(spark):
    """DataFrame triangle listing equals the DuckDB three-way join."""
    g = _graph(8, n=16, m=45)
    edges = pd.DataFrame({"src": g.src, "dst": g.dst, "c": g.edge_weight})
    tri = cliques_df(
        spark.createDataFrame(edges), 3
    ).groupBy().count().withColumnRenamed("count", "n_tri")
    assert_equivalent(
        tri,
        """
        SELECT COUNT(*) AS n_tri
        FROM edges e1 JOIN edges e2 ON e1.dst = e2.src
        JOIN edges e3 ON e3.src = e1.src AND e3.dst = e2.dst
        """,
        edges=edges,
    )


def test_spark_f_matches_local_f(spark):
    """f(V) computed by the Spark stats aggregation equals the local f."""
    g = _graph(9, n=20, m=55)
    rl = peel_local(g, FD, dupin(0.1))
    rs = peel_spark(spark, g, FD, dupin(0.1))
    assert rs.densities[0] == pytest.approx(rl.densities[0], abs=1e-9)
