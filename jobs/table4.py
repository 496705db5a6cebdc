"""Reproduce Table IV: ablation study (rerank / ANNS / key frames)."""
import sys, pathlib

sys.path.insert(0, str(pathlib.Path(__file__).parent))
from common import get_spark, table_args

from repro.experiments import format_rows, run_table4


def main():
    args = table_args(__doc__, sf=0.5, cost_scale=25.0)
    spark = get_spark("table4")
    rows = run_table4(spark, sf=args.sf, cost_scale=args.cost_scale)
    print("\nTable IV — ablation: AveP and latency (s) on Q1.1/Q1.2/Q2.1/Q2.2\n")
    print(format_rows(rows))
    spark.stop()


if __name__ == "__main__":
    main()
