"""Flagship job: run Dupin's Spark peeling engine on a dataset and emit
the detected (fraud) community as a DataFrame.

Usage: ``spark-submit jobs/dupin_detect.py [dataset] [scale] [metric] [eps]``
"""
from __future__ import annotations

import sys

import pandas as pd
from pyspark.sql import DataFrame, SparkSession

from repro.core import by_name, peel_spark
from repro.core.schedules import lpo
from repro.graphgen import load_dataset


def run(
    spark: SparkSession,
    dataset: str = "gfg",
    scale: float = 0.25,
    metric_name: str = "DW",
    eps: float = 0.1,
) -> DataFrame:
    """Detect the densest community with DupinLPO on the Spark engine."""
    graph = load_dataset(dataset, scale)
    metric = by_name(metric_name)
    res = peel_spark(spark, graph, metric, lpo(eps))
    comm = graph.labels.get("fraud_community")
    out = pd.DataFrame(
        {
            "vid": res.best_set,
            "fraud_community": (
                comm[res.best_set] if comm is not None else -1
            ),
        }
    )
    out["density"] = res.best_density
    return spark.createDataFrame(out)


if __name__ == "__main__":
    args = sys.argv[1:]
    ds = args[0] if args else "gfg"
    sc = float(args[1]) if len(args) > 1 else 0.25
    mn = args[2] if len(args) > 2 else "DW"
    ep = float(args[3]) if len(args) > 3 else 0.1
    spark = (
        SparkSession.builder.appName("repro-dupin-detect")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .getOrCreate()
    )
    try:
        df = run(spark, ds, sc, mn, ep)
        df.show(50)
        print(f"detected community size: {df.count()}")
    finally:
        spark.stop()
