"""spark-submit entrypoint reproducing the paper's table2 experiment.

Usage: spark-submit jobs/table2.py   (or: python jobs/table2.py)
Scale via the REPRO_N env var (stream length; default 2,000,000).
"""
from pyspark.sql import SparkSession

from repro.experiments import table2


def main() -> None:
    spark = (
        SparkSession.builder.appName("qlove-table2")
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .getOrCreate()
    )
    try:
        table2.main(spark=spark)
    finally:
        spark.stop()


if __name__ == "__main__":
    main()
