"""spark-submit entrypoint reproducing the paper's throughput experiment.

Usage: spark-submit jobs/throughput.py   (or: python jobs/throughput.py)
Scale via the REPRO_N env var (stream length; default 2,000,000).
"""
from pyspark.sql import SparkSession

from repro.experiments import throughput


def main() -> None:
    spark = (
        SparkSession.builder.appName("qlove-throughput")
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .getOrCreate()
    )
    try:
        throughput.main(spark=spark)
    finally:
        spark.stop()


if __name__ == "__main__":
    main()
