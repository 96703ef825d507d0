"""Reproduce paper Table 3 (average explanation scores per method) and
Fig 2 (explainability distance from Brute-Force).

    spark-submit jobs/table3_scores.py [--paper-scale]
"""
from _session import get_session, scale_from_args

from repro.eval.tables import fig2_distances, table2, table3


def main(spark, scale=None):
    t2 = table2(spark, scale)
    t3 = table3(t2)
    print("\n=== Table 3: average explanation scores ===")
    print(t3.to_string(index=False))
    d = fig2_distances(t2)
    print("\n=== Fig 2: distance from Brute-Force explainability ===")
    print(
        d.groupby("Method")["Distance"].mean().round(3).to_string()
    )
    return t3


if __name__ == "__main__":
    main(get_session("table3"), scale_from_args(__doc__))
