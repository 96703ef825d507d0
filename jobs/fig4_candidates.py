"""Reproduce paper Fig 4: running time vs number of candidate attributes
for No-Pruning / Offline-Pruning / full MCIMR.

    spark-submit jobs/fig4_candidates.py
"""
from _session import get_session, scale_from_args

from repro.eval.tables import fig4_candidates_sweep


def main(spark, scale=None):
    df = fig4_candidates_sweep(spark, scale)
    print("\n=== Fig 4: runtime vs |A| ===")
    print(df.to_string(index=False))
    return df


if __name__ == "__main__":
    main(get_session("fig4"), scale_from_args(__doc__))
