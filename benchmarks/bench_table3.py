"""Benchmark target regenerating Table 3 (slowdown vs HQI @ recall 0.8)
across all five datasets. This is the heavy end-to-end run: it builds
every index, tunes nprobe per template, and times full workload
execution on the distributed engine. Its results are cached in-process
and reused by the Table 4 benchmark."""
import os

from repro.bench.config import current_scale
from repro.bench.e2e import run_all
from repro.bench.report import (
    format_details,
    format_table2,
    format_table3,
    format_table3_scans,
)

RESULTS_DIR = os.path.join(os.path.dirname(__file__), "..", "bench_results")


def _emit(name: str, text: str) -> None:
    os.makedirs(RESULTS_DIR, exist_ok=True)
    with open(os.path.join(RESULTS_DIR, name), "w") as f:
        f.write(text + "\n")
    print("\n" + text)


def test_table3_slowdown(spark, benchmark):
    scale = current_scale()
    rows = benchmark.pedantic(
        lambda: run_all(spark, scale), rounds=1, iterations=1
    )
    _emit("table2.txt", "Table 2 (reproduction)\n" + format_table2(scale))
    _emit(
        "table3.txt",
        "Table 3 (reproduction): slowdown vs HQI @ recall >= 0.8\n"
        "(a) wall time, single-node engine (paper's setting)\n"
        + format_table3(rows)
        + "\n\n(b) wall time, distributed engine (constant ~2s floor"
        " compresses ratios)\n"
        + format_table3(rows, time_attr="spark_run_seconds")
        + "\n\n(c) relative tuples scanned (paper's runtime proxy, §6.3)\n"
        + format_table3_scans(rows)
        + "\n\n"
        + format_details(rows),
    )
    hqi = {r.dataset: r for r in rows if r.approach == "hqi"}
    assert set(hqi) == {"RelatedQS", "LP", "MSTuring", "SIFT", "YandexT2I"}
    # HQI must reach the recall target everywhere.
    assert all(r.recall >= scale.target_recall - 0.05 for r in hqi.values())
