"""Table 10 — index size (MiB) of the variants on the 4 largest graphs."""
from pyspark.sql import SparkSession

from repro.experiments.tables import table10


def run(spark: SparkSession):
    return spark.createDataFrame(table10().reset_index())


if __name__ == "__main__":
    from _common import get_spark

    run(get_spark("table10")).show(truncate=False)
