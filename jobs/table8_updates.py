"""Reproduce Table VIII (quality of S after update workloads) and the
per-update latencies behind Fig. 7. Driver-only (per-edge updates are
in-memory operations; see DESIGN.md §2) — no SparkSession needed.

Usage: python jobs/table8_updates.py [dataset ...]
"""
import sys

from repro.tables import table8


def main() -> None:
    names = sys.argv[1:] or None
    df = table8.run(names=names)
    print("\n=== Table VIII (reproduced) ===")
    print(df.to_string(index=False))


if __name__ == "__main__":
    main()
