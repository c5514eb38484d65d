"""Reproduce Table 5: robustness to future queries — HQI trained on t0
only, all four RelatedQS temporal splits executed against it.

Usage: spark-submit jobs/table5_robustness.py [--scale bench|test]
"""
from _common import get_spark, parse_scale

from repro.bench.report import format_table5
from repro.bench.robustness import run_robustness


def main() -> None:
    scale = parse_scale(__doc__)
    spark = get_spark("table5")
    rows = run_robustness(spark, scale)
    print("Table 5 (reproduction): QPS by split, normalized by HQI @ t0")
    print(format_table5(rows))


if __name__ == "__main__":
    main()
