"""Reproduce paper Table 4: top-5 unexplained data groups for SO Q1.

    spark-submit jobs/table4_subgroups.py [--paper-scale]
"""
from _session import get_session, scale_from_args

from repro.eval.tables import table4


def main(spark, scale=None):
    df = table4(spark, scale)
    print("\n=== Table 4: top-5 unexplained groups for SO Q1 ===")
    print(f"(global explanation: {df.attrs.get('explanation')})")
    print(df.to_string(index=False))
    return df


if __name__ == "__main__":
    main(get_session("table4"), scale_from_args(__doc__))
