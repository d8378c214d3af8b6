"""spark-submit entrypoint reproducing the paper's Table 7.

Usage: ``spark-submit jobs/table7.py`` — prints the table and writes
``results/table7.md``. The underlying harness is
``repro.experiments.tables.table7``; see DESIGN.md §6 for the mapping.
"""
from pyspark.sql import DataFrame, SparkSession

try:
    from jobs._common import main, rows_to_df
except ImportError:  # spark-submit puts jobs/ itself on sys.path
    from _common import main, rows_to_df
from repro.experiments.tables import table7


def run(spark: SparkSession) -> DataFrame:
    """Build the Table 7 rows as a Spark DataFrame."""
    return rows_to_df(spark, table7())


if __name__ == "__main__":
    main("table7", table7, "Table 7")
