"""spark-submit entrypoint reproducing the paper's Table 8.

Usage: ``spark-submit jobs/table8.py`` — prints the table and writes
``results/table8.md``. The underlying harness is
``repro.experiments.tables.table8``; see DESIGN.md §6 for the mapping.
"""
from pyspark.sql import DataFrame, SparkSession

try:
    from jobs._common import main, rows_to_df
except ImportError:  # spark-submit puts jobs/ itself on sys.path
    from _common import main, rows_to_df
from repro.experiments.tables import table8


def run(spark: SparkSession) -> DataFrame:
    """Build the Table 8 rows as a Spark DataFrame."""
    return rows_to_df(spark, table8())


if __name__ == "__main__":
    main("table8", table8, "Table 8")
