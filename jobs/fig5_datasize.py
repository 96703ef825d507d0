"""Reproduce paper Fig 5: running time vs dataset size.

    spark-submit jobs/fig5_datasize.py
"""
from _session import get_session, scale_from_args

from repro.eval.tables import fig5_datasize_sweep


def main(spark, scale=None):
    df = fig5_datasize_sweep(spark, scale)
    print("\n=== Fig 5: runtime vs |D| ===")
    print(df.to_string(index=False))
    return df


if __name__ == "__main__":
    main(get_session("fig5"), scale_from_args(__doc__))
