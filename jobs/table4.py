"""spark-submit entrypoint reproducing the paper's Table 4.

Usage: ``spark-submit jobs/table4.py`` — prints the table and writes
``results/table4.md``. The underlying harness is
``repro.experiments.tables.table4``; see DESIGN.md §6 for the mapping.
"""
from pyspark.sql import DataFrame, SparkSession

try:
    from jobs._common import main, rows_to_df
except ImportError:  # spark-submit puts jobs/ itself on sys.path
    from _common import main, rows_to_df
from repro.experiments.tables import table4


def run(spark: SparkSession) -> DataFrame:
    """Build the Table 4 rows as a Spark DataFrame."""
    return rows_to_df(spark, table4())


if __name__ == "__main__":
    main("table4", table4, "Table 4")
