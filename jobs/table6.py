"""spark-submit entrypoint reproducing the paper's Table 6.

Usage: ``spark-submit jobs/table6.py`` — prints the table and writes
``results/table6.md``. The underlying harness is
``repro.experiments.tables.table6``; see DESIGN.md §6 for the mapping.
"""
from pyspark.sql import DataFrame, SparkSession

try:
    from jobs._common import main, rows_to_df
except ImportError:  # spark-submit puts jobs/ itself on sys.path
    from _common import main, rows_to_df
from repro.experiments.tables import table6


def run(spark: SparkSession) -> DataFrame:
    """Build the Table 6 rows as a Spark DataFrame."""
    return rows_to_df(spark, table6())


if __name__ == "__main__":
    main("table6", table6, "Table 6")
