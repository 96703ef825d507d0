"""Reproduce paper Fig 3 (robustness to missing data) and the §5.2
missingness/selection-bias stats (--stats).

    spark-submit jobs/fig3_missing.py [--stats]
"""
import sys

from _session import get_session, scale_from_args

from repro.eval.tables import fig3_missing_robustness, missingness_stats


def main(spark, scale=None, stats=False):
    if stats:
        df = missingness_stats(spark, scale)
        print("\n=== §5.2: missingness and selection-bias stats ===")
        print(df.to_string(index=False))
        return df
    df = fig3_missing_robustness(spark, scale)
    print("\n=== Fig 3: explainability vs missing data ===")
    print(df.to_string(index=False))
    return df


if __name__ == "__main__":
    stats = "--stats" in sys.argv
    if stats:
        sys.argv.remove("--stats")
    main(get_session("fig3"), scale_from_args(__doc__), stats=stats)
