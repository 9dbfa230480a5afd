"""The full Kaskade pipeline (§ IV + § V) on each heterogeneous graph:
mine constraints for Q1's pattern, enumerate connector candidates,
estimate their sizes, select under a space budget (0/1 knapsack), and
print each candidate with its rewriting.

    spark-submit jobs/end_to_end.py [--profile test|bench]
"""
from _common import profile_arg, session

from repro.workload import end_to_end_selection_rows, format_rows


def main() -> None:
    profile = profile_arg()
    spark = session("kaskade-end-to-end")
    spark.sparkContext.setLogLevel("ERROR")
    print(f"\n=== § V view selection + rewriting (profile={profile}) ===")
    print(format_rows(end_to_end_selection_rows(spark, profile)))
    spark.stop()


if __name__ == "__main__":
    main()
