"""spark-submit entrypoint reproducing Table II: HBBMC++ vs RRef / RDegen / RRcd / RFac.

Usage: python jobs/table2_baselines.py [--scale bench|test] [--mode local|dist]
       [--datasets NA FB ...] [--markdown]
"""
from _common import emit, get_spark, parse_args

from repro.tables import table2


def main(argv=None) -> None:
    args = parse_args(argv)
    spark = get_spark(args)
    rows = table2(names=args.datasets, scale=args.scale, mode=args.mode, spark=spark)
    emit(rows, args)
    if spark is not None:
        spark.stop()


if __name__ == "__main__":
    main()
