"""§ VII-D (Fig. 5): estimated vs. actual 2-hop connector sizes over
edge prefixes of each dataset (α=50, α=95, Erdős–Rényi, actual).

    spark-submit jobs/fig5_size_estimation.py [--profile test|bench]
"""
from _common import profile_arg, session

from repro.workload import fig5_rows, format_rows


def main() -> None:
    profile = profile_arg()
    spark = session("kaskade-fig5")
    spark.sparkContext.setLogLevel("ERROR")
    print(f"\n=== Fig. 5 — 2-hop connector size estimation (profile={profile}) ===")
    print(format_rows(fig5_rows(spark, profile)))
    spark.stop()


if __name__ == "__main__":
    main()
