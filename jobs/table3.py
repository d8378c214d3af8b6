"""spark-submit entrypoint reproducing the paper's Table 3.

Usage: ``spark-submit jobs/table3.py`` — prints the table and writes
``results/table3.md``. The underlying harness is
``repro.experiments.tables.table3``; see DESIGN.md §6 for the mapping.
"""
from pyspark.sql import DataFrame, SparkSession

try:
    from jobs._common import main, rows_to_df
except ImportError:  # spark-submit puts jobs/ itself on sys.path
    from _common import main, rows_to_df
from repro.experiments.tables import table3


def run(spark: SparkSession) -> DataFrame:
    """Build the Table 3 rows as a Spark DataFrame."""
    return rows_to_df(spark, table3())


if __name__ == "__main__":
    main("table3", table3, "Table 3")
