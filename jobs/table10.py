"""spark-submit entrypoint reproducing the paper's Table 10.

Usage: ``spark-submit jobs/table10.py`` — prints the table and writes
``results/table10.md``. The underlying harness is
``repro.experiments.tables.table10``; see DESIGN.md §6 for the mapping.
"""
from pyspark.sql import DataFrame, SparkSession

try:
    from jobs._common import main, rows_to_df
except ImportError:  # spark-submit puts jobs/ itself on sys.path
    from _common import main, rows_to_df
from repro.experiments.tables import table10


def run(spark: SparkSession) -> DataFrame:
    """Build the Table 10 rows as a Spark DataFrame."""
    return rows_to_df(spark, table10())


if __name__ == "__main__":
    main("table10", table10, "Table 10")
