"""Table III: dataset statistics (|V|, |E|, type counts) for the four
SF-scaled evaluation graphs.

    spark-submit jobs/table3_datasets.py [--profile test|bench]
"""
from _common import profile_arg, session

from repro.workload import format_rows, table3_rows


def main() -> None:
    profile = profile_arg()
    spark = session("kaskade-table3")
    spark.sparkContext.setLogLevel("ERROR")
    print(f"\n=== Table III — dataset statistics (profile={profile}) ===")
    print(format_rows(table3_rows(spark, profile)))
    spark.stop()


if __name__ == "__main__":
    main()
