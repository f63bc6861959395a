"""spark-submit entrypoint reproducing the paper's table4 experiment.

Usage: spark-submit jobs/table4.py   (or: python jobs/table4.py)
Scale via the REPRO_N env var (stream length; default 2,000,000).
"""
from pyspark.sql import SparkSession

from repro.experiments import table4


def main() -> None:
    spark = (
        SparkSession.builder.appName("qlove-table4")
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .getOrCreate()
    )
    try:
        table4.main(spark=spark)
    finally:
        spark.stop()


if __name__ == "__main__":
    main()
