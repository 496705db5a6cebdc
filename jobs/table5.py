"""Reproduce Table V: LOVO across ANN variants (BF / IVF-PQ / HNSW)."""
import sys, pathlib

sys.path.insert(0, str(pathlib.Path(__file__).parent))
from common import get_spark, table_args

from repro.experiments import format_rows, run_table5


def main():
    args = table_args(__doc__, sf=0.5, cost_scale=25.0)
    spark = get_spark("table5")
    rows = run_table5(spark, sf=args.sf, cost_scale=args.cost_scale)
    print("\nTable V — ANN variants on Cityscapes (Q1.1–Q1.4)\n")
    print(format_rows(rows))
    spark.stop()


if __name__ == "__main__":
    main()
