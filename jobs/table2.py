"""spark-submit entrypoint reproducing Table II (see EXPERIMENTS.md).

Usage: spark-submit jobs/table2.py [--scale 1.0] [--seed 0]
"""
from repro.experiments.tables import table2

from _common import session, table_args


def main() -> None:
    args = table_args(__doc__)
    spark = session("table2")
    print(table2(spark, scale=args.scale, seed=args.seed).to_text())
    spark.stop()


if __name__ == "__main__":
    main()
