"""Tables 4/5/11 — ND / ULCV / AR of 12 layout methods on 6 small graphs."""
from pyspark.sql import SparkSession

from repro.experiments.tables import format_tables, table4_5_11


def run(spark: SparkSession):
    return table4_5_11()


if __name__ == "__main__":
    from _common import get_spark

    spark = get_spark("quality")
    tables = run(spark)
    print(format_tables({
        "Table 4 (ND)": tables["ND"],
        "Table 5 (ULCV)": tables["ULCV"],
        "Table 11 (AR)": tables["AR"],
    }))
