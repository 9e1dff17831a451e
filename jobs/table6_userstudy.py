"""Table 6 — simulated user study (T3: Tau-Push vs PI indistinguishability)."""
from pyspark.sql import SparkSession

from repro.userstudy import build_groups, simulate_t3


def run(spark: SparkSession):
    groups = build_groups(seed=0)
    return spark.createDataFrame(simulate_t3(groups, seed=7))


if __name__ == "__main__":
    from _common import get_spark

    run(get_spark("table6")).show()
