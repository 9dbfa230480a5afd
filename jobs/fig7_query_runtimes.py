"""§ VII-F (Fig. 7): total query runtimes for Q1–Q8 over the
(summarized) graph vs. the 2-hop connector view, per dataset.

    spark-submit jobs/fig7_query_runtimes.py [--profile test|bench]
"""
from _common import profile_arg, session

from repro.workload import fig7_rows, format_rows


def main() -> None:
    profile = profile_arg()
    spark = session("kaskade-fig7")
    spark.sparkContext.setLogLevel("ERROR")
    print(f"\n=== Fig. 7 — query runtimes baseline vs. connector view "
          f"(profile={profile}) ===")
    print(format_rows(fig7_rows(spark, profile)))
    spark.stop()


if __name__ == "__main__":
    main()
