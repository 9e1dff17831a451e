"""Table 9 — preprocessing time (s) of the variants on the 4 largest graphs."""
from pyspark.sql import SparkSession

from repro.experiments.tables import table9


def run(spark: SparkSession):
    return spark.createDataFrame(table9().reset_index())


if __name__ == "__main__":
    from _common import get_spark

    run(get_spark("table9")).show(truncate=False)
