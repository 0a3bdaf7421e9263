"""Figure 11's adversarial-shift experiment rendered as a table.

Usage: python jobs/adversarial_shifts.py [--streams-per-n K] [--trials T]
"""
from __future__ import annotations

import argparse
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).parent))
from _session import get_spark  # noqa: E402

from repro.experiments import adversarial_shifts, dump_results, print_table  # noqa: E402


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--records", type=int, default=100_000)
    ap.add_argument("--seg-len", type=int, default=20_000)
    ap.add_argument("--streams-per-n", type=int, default=4)
    ap.add_argument("--budget", type=int, default=2500)
    ap.add_argument("--trials", type=int, default=100)
    ap.add_argument("--out", default="results/adversarial.json")
    args = ap.parse_args()

    spark = get_spark("adversarial")
    table = adversarial_shifts(
        spark,
        n_records=args.records,
        seg_len=args.seg_len,
        streams_per_n=args.streams_per_n,
        budget=args.budget,
        n_trials=args.trials,
    )
    print_table("Adversarial shifts: mean median-segment RMSE by n_shifts", table)
    dump_results(table, args.out)
    spark.stop()


if __name__ == "__main__":
    main()
