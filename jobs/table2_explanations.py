"""Reproduce paper Table 2 (explanations per method per query) and the
random-query usefulness stat of §5.1 (--random).

    spark-submit jobs/table2_explanations.py [--paper-scale]
"""
import sys

from _session import get_session, scale_from_args

from repro.eval.tables import random_query_usefulness, table2


def main(spark, scale=None, random=False):
    if random:
        df = random_query_usefulness(spark, scale)
        frac = df["Useful"].mean() if len(df) else 0.0
        print("\n=== Random-query usefulness (paper: 72.5%) ===")
        print(df.to_string(index=False))
        print(f"\nUseful: {100 * frac:.1f}%")
        return df
    df = table2(spark, scale)
    print("\n=== Table 2: explanations per method ===")
    print(df.to_string(index=False))
    return df


if __name__ == "__main__":
    random = "--random" in sys.argv
    if random:
        sys.argv.remove("--random")
    main(get_session("table2"), scale_from_args(__doc__), random=random)
