"""spark-submit entrypoint reproducing the paper's table5 experiment.

Usage: spark-submit jobs/table5.py   (or: python jobs/table5.py)
Scale via the REPRO_N env var (stream length; default 2,000,000).
"""
from pyspark.sql import SparkSession

from repro.experiments import table5


def main() -> None:
    spark = (
        SparkSession.builder.appName("qlove-table5")
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .getOrCreate()
    )
    try:
        table5.main(spark=spark)
    finally:
        spark.stop()


if __name__ == "__main__":
    main()
