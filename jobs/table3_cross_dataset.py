"""spark-submit entrypoint for Table 3 (cross-dataset matcher quality, App. C.2)."""
import sys

from pyspark.sql import SparkSession

from repro.experiments.table3 import run_table3, table3_matrix


def main() -> None:
    spark = (
        SparkSession.builder.appName("table3_cross_dataset")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .getOrCreate()
    )
    spark.sparkContext.setLogLevel("ERROR")
    tidy = run_table3(spark)
    print("\nPer-matcher results:")
    print(tidy[tidy["matcher"] != "average"].to_string(index=False))
    print("\nTable 3 — averages in the paper's layout:")
    print(table3_matrix(tidy).round(3).to_string())


if __name__ == "__main__":
    sys.exit(main())
