"""Reproduce Table VII: LOVO on the ActivityNet-QA extension queries."""
import sys, pathlib

sys.path.insert(0, str(pathlib.Path(__file__).parent))
from common import get_spark, table_args

from repro.experiments import format_rows, run_table7


def main():
    args = table_args(__doc__, sf=0.5, cost_scale=0.0)
    spark = get_spark("table7")
    rows = run_table7(spark, sf=args.sf, cost_scale=args.cost_scale)
    print("\nTable VII — LOVO on ActivityNet-QA (EQ1–EQ4)\n")
    print(format_rows(rows))
    spark.stop()


if __name__ == "__main__":
    main()
