"""§ VII-E (Fig. 6): effective graph size reduction — raw →
vertex-inclusion summarizer → 2-hop connector on prov and dblp.

    spark-submit jobs/fig6_size_reduction.py [--profile test|bench]
"""
from _common import profile_arg, session

from repro.workload import fig6_rows, format_rows


def main() -> None:
    profile = profile_arg()
    spark = session("kaskade-fig6")
    spark.sparkContext.setLogLevel("ERROR")
    print(f"\n=== Fig. 6 — effective size reduction (profile={profile}) ===")
    print(format_rows(fig6_rows(spark, profile)))
    spark.stop()


if __name__ == "__main__":
    main()
