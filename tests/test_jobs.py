"""Tests for the spark-submit job wrappers."""
import numpy as np
import pytest

from jobs import dupin_detect, table2
from jobs._common import rows_to_df


def test_rows_to_df_stringifies_mixed_columns(spark):
    rows = [{"a": 1, "b": "TLE"}, {"a": 2.5, "b": "0.12"}]
    df = rows_to_df(spark, rows)
    assert df.columns == ["a", "b"]
    got = [tuple(r) for r in df.collect()]
    assert got == [("1", "TLE"), ("2.5", "0.12")]


def test_table2_job_run(spark):
    df = table2.run(spark)
    assert df.count() == 8
    assert "System" in df.columns


def test_dupin_detect_job(spark):
    df = dupin_detect.run(spark, dataset="gfg", scale=0.1, metric_name="DW")
    rows = df.collect()
    assert len(rows) > 0
    assert {"vid", "fraud_community", "density"} <= set(df.columns)
    dens = {r["density"] for r in rows}
    assert len(dens) == 1 and dens.pop() > 0


def test_dupin_detect_flags_fraud_block(spark):
    """The end-to-end Spark job should surface the planted fraud block."""
    from repro.graphgen import load_dataset

    g = load_dataset("gfg", 0.1)
    df = dupin_detect.run(spark, dataset="gfg", scale=0.1, metric_name="DW")
    found = {r["vid"] for r in df.collect()}
    comm = g.labels["fraud_community"]
    planted = set(np.flatnonzero(comm >= 0).tolist())
    # the detected dense community is dominated by planted fraud vertices
    assert len(found & planted) / len(found) >= 0.6
