"""spark-submit entrypoint reproducing the paper's Table 9.

Usage: ``spark-submit jobs/table9.py`` — prints the table and writes
``results/table9.md``. The underlying harness is
``repro.experiments.tables.table9``; see DESIGN.md §6 for the mapping.
"""
from pyspark.sql import DataFrame, SparkSession

try:
    from jobs._common import main, rows_to_df
except ImportError:  # spark-submit puts jobs/ itself on sys.path
    from _common import main, rows_to_df
from repro.experiments.tables import table9


def run(spark: SparkSession) -> DataFrame:
    """Build the Table 9 rows as a Spark DataFrame."""
    return rows_to_df(spark, table9())


if __name__ == "__main__":
    main("table9", table9, "Table 9")
