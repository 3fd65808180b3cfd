"""spark-submit entrypoint reproducing the paper's table5 (see DESIGN.md).

Usage: spark-submit jobs/table5.py [scale]   (scale: test|bench, default bench)
"""
import sys

from pyspark.sql import SparkSession

from repro.harness.tables import ALL_TABLES, format_table


def main() -> None:
    spark = (
        SparkSession.builder.appName("repro-table5")
        .config("spark.sql.shuffle.partitions", "16")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .getOrCreate()
    )
    spark.sparkContext.setLogLevel("ERROR")
    kwargs = {}
    fn = ALL_TABLES["table5"]
    if len(sys.argv) > 1 and "scale" in fn.__code__.co_varnames:
        kwargs["scale"] = sys.argv[1]
    print(format_table(fn(spark, **kwargs)))
    spark.stop()


if __name__ == "__main__":
    main()
