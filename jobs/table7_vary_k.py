"""Table 7 — PPRviz preprocessing/response time on the Twitter analog,
varying the cluster-size cap k in {5, 10, 25, 50, 100}."""
from pyspark.sql import SparkSession

from repro.experiments.tables import table7


def run(spark: SparkSession):
    return spark.createDataFrame(table7())


if __name__ == "__main__":
    from _common import get_spark

    run(get_spark("table7")).show()
