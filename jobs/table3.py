"""spark-submit entrypoint reproducing Table III (see EXPERIMENTS.md).

Usage: spark-submit jobs/table3.py [--scale 1.0] [--seed 0]
"""
from repro.experiments.tables import table3

from _common import session, table_args


def main() -> None:
    args = table_args(__doc__)
    spark = session("table3")
    print(table3(spark, scale=args.scale, seed=args.seed).to_text())
    spark.stop()


if __name__ == "__main__":
    main()
