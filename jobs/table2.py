"""Print the query workloads (paper Table II, and Table VI with --extension)."""
import argparse

from repro.experiments import format_rows, run_table2


def main():
    p = argparse.ArgumentParser(description=__doc__)
    p.add_argument("--extension", action="store_true",
                   help="print the ActivityNet-QA extension queries (Table VI)")
    args = p.parse_args()
    title = "Table VI — extension queries" if args.extension else "Table II — workload queries"
    print(f"\n{title}\n")
    print(format_rows(run_table2(extension=args.extension)))


if __name__ == "__main__":
    main()
