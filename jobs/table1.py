"""spark-submit entrypoint reproducing the paper's table1 experiment.

Usage: spark-submit jobs/table1.py   (or: python jobs/table1.py)
Scale via the REPRO_N env var (stream length; default 2,000,000).
"""
from pyspark.sql import SparkSession

from repro.experiments import table1


def main() -> None:
    spark = (
        SparkSession.builder.appName("qlove-table1")
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .getOrCreate()
    )
    try:
        table1.main(spark=spark)
    finally:
        spark.stop()


if __name__ == "__main__":
    main()
