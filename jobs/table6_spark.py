"""Table 6 (extra): driver-sequential vs Spark-distributed PARTITION BY.

Run: spark-submit jobs/table6_spark.py
"""
from _common import emit, parse_args

from pyspark.sql import SparkSession

from repro.harness.experiments import table6_spark


def main() -> None:
    args = parse_args(__doc__, needs_spark=True)
    spark = (
        SparkSession.builder.appName("repro-table6")
        .config("spark.sql.shuffle.partitions", "16")
        .getOrCreate()
    )
    try:
        emit(table6_spark(spark, n_events=min(args.events, 50_000), seed=args.seed))
    finally:
        spark.stop()


if __name__ == "__main__":
    main()
