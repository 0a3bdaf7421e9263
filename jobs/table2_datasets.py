"""Reproduce Table 2: dataset predicates, positivity rates p, proxy correlation r.

Usage: python jobs/table2_datasets.py [--records N] [--seg-len L]
"""
from __future__ import annotations

import argparse
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).parent))
from _session import get_spark  # noqa: E402

from repro.experiments import dump_results, load_streams, print_table, table2  # noqa: E402


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--records", type=int, default=500_000)
    ap.add_argument("--seg-len", type=int, default=100_000)
    ap.add_argument("--out", default="results/table2.json")
    args = ap.parse_args()

    spark = get_spark("table2")
    streams = load_streams(n_records=args.records, seg_len=args.seg_len)
    table = table2(spark, streams)
    print_table("Table 2 (paper targets vs measured)", table)
    dump_results(table, args.out)
    spark.stop()


if __name__ == "__main__":
    main()
