"""Reproduce paper Table 1: dataset sizes and extracted-attribute counts.

    spark-submit jobs/table1_datasets.py [--paper-scale]
"""
from _session import get_session, scale_from_args

from repro.eval.tables import table1


def main(spark, scale=None):
    df = table1(spark, scale)
    print("\n=== Table 1: Examined Datasets ===")
    print(df.to_string(index=False))
    return df


if __name__ == "__main__":
    main(get_session("table1"), scale_from_args(__doc__))
