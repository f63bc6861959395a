"""spark-submit entrypoint reproducing the paper's scalability experiment.

Usage: spark-submit jobs/scalability.py   (or: python jobs/scalability.py)
Scale via the REPRO_N env var (stream length; default 2,000,000).
"""
from pyspark.sql import SparkSession

from repro.experiments import scalability


def main() -> None:
    spark = (
        SparkSession.builder.appName("qlove-scalability")
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .getOrCreate()
    )
    try:
        scalability.main(spark=spark)
    finally:
        spark.stop()


if __name__ == "__main__":
    main()
