"""Shared runner for spark-submit table jobs.

Each job exposes ``run(spark) -> DataFrame`` (rows of the reproduced
table) and, when executed as a script, builds the session, shows the
table, and writes ``results/<name>.md``.
"""
from __future__ import annotations

import sys

from pyspark.sql import DataFrame, SparkSession


def rows_to_df(spark: SparkSession, rows: list[dict]) -> DataFrame:
    """List-of-dicts (table harness output) -> Spark DataFrame, with every
    value stringified so mixed TLE/number columns keep one type."""
    cols = list(rows[0].keys()) if rows else ["empty"]
    data = [tuple(str(r.get(c, "")) for c in cols) for r in rows]
    return spark.createDataFrame(data, schema=cols)


def main(job_name: str, table_fn, title: str, **kwargs) -> None:
    from repro.experiments.io import write_table

    spark = (
        SparkSession.builder.appName(f"repro-{job_name}")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .getOrCreate()
    )
    try:
        rows = table_fn(**kwargs)
        md = write_table(job_name, rows, title)
        print(md, file=sys.stderr)
        rows_to_df(spark, rows).show(100, truncate=False)
    finally:
        spark.stop()
