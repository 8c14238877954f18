"""spark-submit entrypoint for the §5.4 SIGMOD-contest case study."""
import sys

from pyspark.sql import SparkSession

from repro.experiments.case_study import run_case_study, summarize


def main() -> None:
    spark = (
        SparkSession.builder.appName("case_study")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .getOrCreate()
    )
    spark.sparkContext.setLogLevel("ERROR")
    results = run_case_study(spark)
    print("\nN-Metrics view (five solutions):")
    print(results["metrics"].round(3).to_string(index=False))
    print("\nThreshold audit (metric/metric sweep):")
    print(results["threshold_audit"].round(3).to_string(index=False))
    print("\nGold pairs missed by >= 4 of 5 solutions:")
    print(results["missed"].to_string(index=False))
    print("\nHeadline numbers:", summarize(results))


if __name__ == "__main__":
    sys.exit(main())
