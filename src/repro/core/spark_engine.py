"""Spark DataFrame peeling engine.

The paper's parallel peeling (Algorithms 2–4) expressed as iterative
vertex-peeling jobs over partitioned edge DataFrames — the PySpark-native
rendition of "GraphX vertex-peeling jobs over partitioned edge RDDs"
(GraphX has no Python API; Catalyst DataFrame ops are the supported
dataflow layer). Each round:

1. aggregates per-vertex peeling weights (``groupBy`` over the symmetric
   edge view, or DataFrame self-join clique counting for TDS/kCLiDS),
2. computes ``f``, ``g`` and the threshold with one ``agg`` action,
3. peels via ``filter`` + ``left_anti`` joins on the edge table,
4. ``localCheckpoint``s vertices and edges so lineage stays flat across
   the O(log_{1+ε}|V|) rounds.

The engine accepts the same :class:`~repro.core.schedules.Schedule`
objects as the local engine for the parallel modes (``threshold`` and
``bucket``); sequential schedules are inherently single-vertex-per-step
and stay on the local engine (see DESIGN.md §4).

Results are bit-compatible with ``local_engine`` (same TOL conventions);
``tests/test_spark_engine.py`` asserts identical peel sets per round.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from repro.core.graph import LocalGraph
from repro.core.local_engine import TOL, PeelResult
from repro.core.metrics import Metric
from repro.core.schedules import Schedule
from repro.core.worklog import WorkLog

MAX_ROUNDS = 100_000  # safety valve: R < log_{1+eps}|V| in theory


def _symmetric(edges: DataFrame) -> DataFrame:
    """Both orientations of the undirected edge table."""
    return edges.select("src", "dst", "c").unionAll(
        edges.select(
            F.col("dst").alias("src"), F.col("src").alias("dst"), "c"
        )
    )


def edge_weights_df(verts: DataFrame, edges: DataFrame) -> DataFrame:
    """Per-vertex peeling weight ``w = a + Σ incident c`` (edge metrics).

    Public so tests can oracle-check the aggregation against DuckDB SQL.
    """
    inc = _symmetric(edges).groupBy("src").agg(F.sum("c").alias("wsum"))
    return (
        verts.join(inc, verts["vid"] == inc["src"], "left")
        .select(
            verts["vid"],
            verts["a"],
            (F.coalesce(F.col("wsum"), F.lit(0.0)) + F.col("a")).alias("w"),
            F.coalesce(F.col("wsum"), F.lit(0.0)).alias("wsum"),
        )
    )


def cliques_df(edges: DataFrame, k: int) -> DataFrame:
    """All k-cliques (columns ``v0 < v1 < ... < v{k-1}``) via self-joins.

    Edges hold ``src < dst``; a clique grows one vertex at a time along
    that order, checking back-edges with one join per earlier member —
    the DataFrame transliteration of ordered clique listing (kCLIST).
    """
    cl = edges.select(F.col("src").alias("v0"), F.col("dst").alias("v1"))
    for j in range(2, k):
        ext = edges.select(
            F.col("src").alias(f"_e{j}"), F.col("dst").alias(f"v{j}")
        )
        cl = cl.join(ext, cl[f"v{j-1}"] == ext[f"_e{j}"]).drop(f"_e{j}")
        for i in range(j - 1):
            back = edges.select(
                F.col("src").alias(f"_b{i}"), F.col("dst").alias(f"_t{i}")
            )
            cl = cl.join(
                back,
                (cl[f"v{i}"] == back[f"_b{i}"])
                & (cl[f"v{j}"] == back[f"_t{i}"]),
            ).drop(f"_b{i}", f"_t{i}")
    return cl


def clique_weights_df(verts: DataFrame, edges: DataFrame, k: int) -> DataFrame:
    """Per-vertex live-clique counts; ``w`` = #cliques containing vertex."""
    cl = cliques_df(edges, k)
    roles = None
    for j in range(k):
        r = cl.select(F.col(f"v{j}").alias("vid"))
        roles = r if roles is None else roles.unionAll(r)
    counts = roles.groupBy("vid").agg(F.count(F.lit(1)).alias("cnt"))
    return verts.join(counts, "vid", "left").select(
        "vid",
        "a",
        F.coalesce(F.col("cnt"), F.lit(0)).cast("double").alias("w"),
    )


def peel_spark(
    spark: SparkSession,
    graph: LocalGraph,
    metric: Metric,
    schedule: Schedule,
    collect_round_sets: bool = False,
) -> PeelResult:
    """Run a parallel peeling schedule as iterative Spark jobs.

    Returns the same :class:`PeelResult` shape as the local engine, so the
    table harnesses and tests treat backends interchangeably.
    """
    if schedule.mode == "sequential":
        raise ValueError(
            "sequential schedules are span-bound by definition; "
            "run them on the local engine (DESIGN.md §4)"
        )
    n0 = graph.n
    k = metric.k
    if metric.kind == "edge":
        ew = metric.build(graph)
        verts = spark.createDataFrame(
            pd.DataFrame({"vid": np.arange(n0, dtype=np.int64), "a": ew.a})
        )
        edges = spark.createDataFrame(
            pd.DataFrame({"src": graph.src, "dst": graph.dst, "c": ew.c})
        )
    else:
        verts, edges = graph.to_spark(spark)
    verts = verts.repartition("vid").localCheckpoint(eager=True)
    edges = edges.repartition("src").localCheckpoint(eager=True)

    factor = k * (1.0 + schedule.eps)
    stamp = np.zeros(n0, dtype=np.int64)
    step = 0
    densities: list[float] = []
    best_g, best_step = -np.inf, 0
    tau_max = 0.0
    rounds = trim_rounds = long_tail = sparse = 0
    log = WorkLog(n=n0, m=graph.m)
    round_sets: list[np.ndarray] | None = [] if collect_round_sets else None

    def weights_of(v: DataFrame, e: DataFrame) -> DataFrame:
        if metric.kind == "edge":
            return edge_weights_df(v, e)
        return clique_weights_df(v, e, k)

    def stats_of(wdf: DataFrame) -> tuple[int, float]:
        """(|S|, f(S)) in one aggregate action."""
        if metric.kind == "edge":
            row = wdf.agg(
                F.count(F.lit(1)).alias("n"),
                F.sum("a").alias("sa"),
                F.sum("wsum").alias("si"),
            ).first()
            n = int(row["n"])
            f = (float(row["sa"] or 0.0) + float(row["si"] or 0.0) / 2.0) if n else 0.0
            return n, f
        row = wdf.agg(
            F.count(F.lit(1)).alias("n"),
            F.sum("a").alias("sa"),
            F.sum("w").alias("sw"),
        ).first()
        n = int(row["n"])
        # each live clique is counted k times across its members' w
        f = (float(row["sw"] or 0.0) / k) if n else 0.0
        return n, f

    def remove(v: DataFrame, e: DataFrame, peeled: DataFrame):
        """Anti-join the peeled set out of both tables; collect its ids."""
        peeled = peeled.localCheckpoint(eager=True)
        ids = np.asarray(
            [r["vid"] for r in peeled.collect()], dtype=np.int64
        )
        v2 = v.join(peeled, "vid", "left_anti").localCheckpoint(eager=True)
        e2 = (
            e.join(peeled.withColumnRenamed("vid", "src"), "src", "left_anti")
            .join(peeled.withColumnRenamed("vid", "dst"), "dst", "left_anti")
            .select("src", "dst", "c")
            .localCheckpoint(eager=True)
        )
        return v2, e2, ids

    wdf = weights_of(verts, edges)
    n_alive, f = stats_of(wdf)
    g0 = f / n_alive if n_alive else 0.0
    densities.append(g0)
    best_g = g0

    while n_alive > 0:
        if rounds >= MAX_ROUNDS:
            raise RuntimeError("peeling failed to terminate")
        gcur = f / n_alive
        if schedule.mode == "bucket":
            wmin = float(wdf.agg(F.min("w")).first()[0])
            peeled_df = wdf.filter(F.col("w") <= wmin + TOL).select("vid")
        else:
            base_tau = factor * gcur
            if schedule.gpo:
                tau_max = max(tau_max, gcur / factor)
                tau = max(tau_max, base_tau)
            else:
                tau = base_tau
            peeled_df = wdf.filter(F.col("w") <= tau + TOL).select("vid")
            if schedule.gpo:
                long_tail += wdf.filter(
                    (F.col("w") <= tau + TOL) & (F.col("w") > base_tau + TOL)
                ).count()
        verts, edges, peeled_ids = remove(verts, edges, peeled_df)
        if peeled_ids.size == 0:  # float safety net: peel the argmin
            amin = wdf.orderBy("w", "vid").limit(1).select("vid")
            verts, edges, peeled_ids = remove(verts, edges, amin)
        step += 1
        rounds += 1
        stamp[peeled_ids] = step
        log.add(n_alive, int(peeled_ids.size), peeled_ids.size, phase="peel")
        if round_sets is not None:
            round_sets.append(np.sort(peeled_ids))

        wdf = weights_of(verts, edges)
        n_alive, f = stats_of(wdf)
        gnew = f / n_alive if n_alive else 0.0
        densities.append(gnew)
        if n_alive and gnew > best_g + TOL:
            best_g, best_step = gnew, step

        if schedule.lpo:
            while n_alive > 0:
                gcur = f / n_alive
                tau2 = max(tau_max, gcur)
                trim_df = wdf.filter(F.col("w") < tau2 - TOL).select("vid")
                verts2, edges2, trimmed = remove(verts, edges, trim_df)
                if trimmed.size == 0 or trimmed.size == n_alive:
                    break
                verts, edges = verts2, edges2
                step += 1
                trim_rounds += 1
                sparse += trimmed.size
                stamp[trimmed] = step
                log.add(n_alive, int(trimmed.size), trimmed.size, phase="trim")
                wdf = weights_of(verts, edges)
                n_alive, f = stats_of(wdf)
                gnew = f / n_alive if n_alive else 0.0
                densities.append(gnew)
                if n_alive and gnew > best_g + TOL:
                    best_g, best_step = gnew, step

    best_set = np.flatnonzero(stamp > best_step)
    return PeelResult(
        best_set=best_set,
        best_density=float(best_g),
        densities=densities,
        n_rounds=rounds,
        n_trim_rounds=trim_rounds,
        long_tail_peeled=long_tail,
        sparse_trimmed=sparse,
        worklog=log,
        peel_stamp=stamp,
        round_sets=round_sets,
    )
