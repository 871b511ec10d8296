"""Reproduce paper Table 4: the key re-scaling ablation (out-of-range /
large-error RMI prediction counts with and without re-scaling).

    spark-submit jobs/table4.py    |    python jobs/table4.py
"""
import argparse
import json

from repro.bench.tables import format_rows, table4


def main() -> None:
    ap = argparse.ArgumentParser(description=__doc__)
    ap.add_argument("--dataset", default="MSL-30k")
    ap.add_argument("--queries", type=int, default=1000)
    ap.add_argument("--json", help="also dump rows as JSON to this path")
    args = ap.parse_args()
    rows = table4(dataset=args.dataset, n_queries=args.queries)
    print(format_rows(rows))
    if args.json:
        with open(args.json, "w") as f:
            json.dump(rows, f, indent=2)


if __name__ == "__main__":
    main()
