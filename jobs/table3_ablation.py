"""spark-submit entrypoint reproducing Table III: ablation and hybrid-with-other-kernels.

Usage: python jobs/table3_ablation.py [--scale bench|test] [--mode local|dist]
       [--datasets NA FB ...] [--markdown]
"""
from _common import emit, get_spark, parse_args

from repro.tables import table3


def main(argv=None) -> None:
    args = parse_args(argv)
    spark = get_spark(args)
    rows = table3(names=args.datasets, scale=args.scale, mode=args.mode, spark=spark)
    emit(rows, args)
    if spark is not None:
        spark.stop()


if __name__ == "__main__":
    main()
