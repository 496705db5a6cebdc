"""Reproduce Table I: capability matrix of object-query method families."""
import sys, pathlib

sys.path.insert(0, str(pathlib.Path(__file__).parent))
from common import get_spark, table_args

from repro.experiments import format_rows, run_table1


def main():
    args = table_args(__doc__, sf=0.3, cost_scale=0.0)
    spark = get_spark("table1")
    rows = run_table1(spark, sf=args.sf, cost_scale=args.cost_scale)
    print("\nTable I — capability matrix (AveP in parentheses; Yes = AveP > 0.3)\n")
    print(format_rows(rows))
    spark.stop()


if __name__ == "__main__":
    main()
