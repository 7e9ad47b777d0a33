"""Reproduce Table VII (indexing time and index size).

Usage: python jobs/table7_index.py [dataset ...]
"""
import sys

sys.path.insert(0, "jobs")
from _session import get_spark  # noqa: E402

from repro.tables import table7  # noqa: E402


def main() -> None:
    spark = get_spark("table7")
    names = sys.argv[1:] or None
    df = table7.run(spark, names=names)
    print("\n=== Table VII (reproduced) ===")
    print(df.to_string(index=False))
    spark.stop()


if __name__ == "__main__":
    main()
