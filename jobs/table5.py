"""Reproduce paper Table 5: per-stage construction time + index memory,
LIDER vs original SK-LSH, on the two largest datasets.

    spark-submit jobs/table5.py    |    python jobs/table5.py
"""
import argparse
import json

from repro.bench.tables import format_rows, table5


def main() -> None:
    ap = argparse.ArgumentParser(description=__doc__)
    ap.add_argument("--json", help="also dump rows as JSON to this path")
    args = ap.parse_args()
    rows = table5()
    print(format_rows(rows))
    if args.json:
        with open(args.json, "w") as f:
            json.dump(rows, f, indent=2)


if __name__ == "__main__":
    main()
