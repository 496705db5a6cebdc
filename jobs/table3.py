"""Reproduce Table III: execution time of ZELDA / UMT / VISA / LOVO."""
import sys, pathlib

sys.path.insert(0, str(pathlib.Path(__file__).parent))
from common import get_spark, table_args

from repro.experiments import format_rows, run_table3


def main():
    args = table_args(__doc__, sf=0.5, cost_scale=25.0)
    spark = get_spark("table3")
    rows = run_table3(spark, sf=args.sf, cost_scale=args.cost_scale, with_accuracy=True)
    print("\nTable III — execution time (seconds) per method × dataset\n")
    print(format_rows(rows))
    spark.stop()


if __name__ == "__main__":
    main()
