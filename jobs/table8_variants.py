"""Table 8 — response time of the 7 PDist-computation variants on the 4
largest graph analogs (None = op-budget exceeded, the paper's '-')."""
from pyspark.sql import SparkSession

from repro.experiments.tables import table8


def run(spark: SparkSession):
    return spark.createDataFrame(table8().reset_index())


if __name__ == "__main__":
    from _common import get_spark

    run(get_spark("table8")).show(truncate=False)
