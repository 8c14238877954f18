"""spark-submit entrypoint for Table 2 (dataset profiling, Appendix C.1)."""
import sys

from pyspark.sql import SparkSession

from repro.experiments.table2 import run_table2


def main() -> None:
    spark = (
        SparkSession.builder.appName("table2_profiling")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .getOrCreate()
    )
    spark.sparkContext.setLogLevel("ERROR")
    df = run_table2(spark)
    print("\nTable 2 — profiling the SIGMOD-like datasets (paper values alongside)")
    print(df.to_string(index=False))


if __name__ == "__main__":
    sys.exit(main())
