"""Reproduce Table I (dataset statistics, k-clique counts).

Usage: python jobs/table1_stats.py [dataset ...]
"""
import sys

sys.path.insert(0, "jobs")
from _session import get_spark  # noqa: E402

from repro.tables import table1  # noqa: E402


def main() -> None:
    spark = get_spark("table1")
    names = sys.argv[1:] or None
    df = table1.run(spark, names=names)
    print("\n=== Table I (reproduced) ===")
    print(df.to_string(index=False))
    spark.stop()


if __name__ == "__main__":
    main()
