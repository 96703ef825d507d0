"""Reproduce paper Fig 6: running time vs the bound k on explanation size.

    spark-submit jobs/fig6_explanation_size.py
"""
from _session import get_session, scale_from_args

from repro.eval.tables import fig6_k_sweep


def main(spark, scale=None):
    df = fig6_k_sweep(spark, scale)
    print("\n=== Fig 6: runtime vs k ===")
    print(df.to_string(index=False))
    return df


if __name__ == "__main__":
    main(get_session("fig6"), scale_from_args(__doc__))
