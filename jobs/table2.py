"""spark-submit entrypoint reproducing the paper's Table 2 (capability
matrix). Usage: ``spark-submit jobs/table2.py``."""
from pyspark.sql import DataFrame, SparkSession

try:
    from jobs._common import main, rows_to_df
except ImportError:  # spark-submit puts jobs/ itself on sys.path
    from _common import main, rows_to_df
from repro.experiments.tables import table2


def run(spark: SparkSession) -> DataFrame:
    """Build the Table 2 rows as a Spark DataFrame."""
    return rows_to_df(spark, table2())


if __name__ == "__main__":
    main("table2", table2, "Table 2")
