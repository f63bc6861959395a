"""spark-submit entrypoint reproducing the paper's table3 experiment.

Usage: spark-submit jobs/table3.py   (or: python jobs/table3.py)
Scale via the REPRO_N env var (stream length; default 2,000,000).
"""
from pyspark.sql import SparkSession

from repro.experiments import table3


def main() -> None:
    spark = (
        SparkSession.builder.appName("qlove-table3")
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .getOrCreate()
    )
    try:
        table3.main(spark=spark)
    finally:
        spark.stop()


if __name__ == "__main__":
    main()
