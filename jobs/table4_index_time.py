"""Reproduce Table 4: index generation time relative to HQI.

Usage: spark-submit jobs/table4_index_time.py [--scale bench|test]
"""
from _common import get_spark, parse_scale

from repro.bench.e2e import run_all
from repro.bench.report import format_table4


def main() -> None:
    scale = parse_scale(__doc__)
    spark = get_spark("table4")
    rows = run_all(spark, scale)
    print("Table 4 (reproduction): index generation time vs HQI")
    print(format_table4(rows))


if __name__ == "__main__":
    main()
