"""spark-submit entrypoint reproducing the paper's Table 5.

Usage: ``spark-submit jobs/table5.py`` — prints the table and writes
``results/table5.md``. The underlying harness is
``repro.experiments.tables.table5``; see DESIGN.md §6 for the mapping.
"""
from pyspark.sql import DataFrame, SparkSession

try:
    from jobs._common import main, rows_to_df
except ImportError:  # spark-submit puts jobs/ itself on sys.path
    from _common import main, rows_to_df
from repro.experiments.tables import table5


def run(spark: SparkSession) -> DataFrame:
    """Build the Table 5 rows as a Spark DataFrame."""
    return rows_to_df(spark, table5())


if __name__ == "__main__":
    main("table5", table5, "Table 5")
