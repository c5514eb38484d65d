"""Reproduce Table 3: workload-execution slowdown of every approach
relative to HQI at Recall >= 0.8, across all five datasets. Also prints
the supplementary per-row metrics (absolute times, recall, tuples
scanned, distance computations).

Usage: spark-submit jobs/table3_slowdown.py [--scale bench|test]
"""
from _common import get_spark, parse_scale

from repro.bench.e2e import run_all
from repro.bench.report import format_details, format_table3, format_table3_scans


def main() -> None:
    scale = parse_scale(__doc__)
    spark = get_spark("table3")
    rows = run_all(spark, scale)
    print("Table 3 (reproduction): slowdown vs HQI @ recall >= 0.8")
    print("(a) wall time, single-node engine (paper's setting)")
    print(format_table3(rows))
    print("\n(b) wall time, distributed engine")
    print(format_table3(rows, time_attr="spark_run_seconds"))
    print("\n(c) relative tuples scanned (paper's runtime proxy)")
    print(format_table3_scans(rows))
    print()
    print(format_details(rows))


if __name__ == "__main__":
    main()
