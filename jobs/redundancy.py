"""spark-submit entrypoint reproducing the paper's redundancy experiment.

Usage: spark-submit jobs/redundancy.py   (or: python jobs/redundancy.py)
Scale via the REPRO_N env var (stream length; default 2,000,000).
"""
from pyspark.sql import SparkSession

from repro.experiments import redundancy


def main() -> None:
    spark = (
        SparkSession.builder.appName("qlove-redundancy")
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .getOrCreate()
    )
    try:
        redundancy.main(spark=spark)
    finally:
        spark.stop()


if __name__ == "__main__":
    main()
