#!/usr/bin/env python
"""spark-submit entrypoint reproducing the paper's table4.

Usage: spark-submit jobs/table4.py [--sf 0.03] [--quick]
"""
import argparse

from repro.session import get_spark
from repro.tables import table4
from repro.tables.common import TableContext, quick_config


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--sf", type=float, default=0.03,
                    help="dataset scale factor (1.0 ~ the real corpora)")
    ap.add_argument("--quick", action="store_true",
                    help="reduced LBP iterations / learning epochs")
    args = ap.parse_args()
    spark = get_spark("repro-table4")
    spark.sparkContext.setLogLevel("ERROR")
    kwargs = {"base_config": quick_config()} if args.quick else {}
    ctx = TableContext(spark, sf=args.sf, **kwargs)
    rows = table4.run(ctx)
    print(table4.render(rows))
    spark.stop()


if __name__ == "__main__":
    main()
