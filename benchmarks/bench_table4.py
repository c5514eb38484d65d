"""Benchmark target regenerating Table 4 (index generation time vs HQI).
Reuses the cached end-to-end rows from the Table 3 benchmark when both
run in one pytest session; standalone it recomputes them."""
import os

from repro.bench.config import current_scale
from repro.bench.e2e import run_all
from repro.bench.report import format_table4

RESULTS_DIR = os.path.join(os.path.dirname(__file__), "..", "bench_results")


def test_table4_index_generation(spark, benchmark):
    scale = current_scale()
    rows = benchmark.pedantic(
        lambda: run_all(spark, scale), rounds=1, iterations=1
    )
    text = "Table 4 (reproduction): index generation time vs HQI\n" + format_table4(rows)
    os.makedirs(RESULTS_DIR, exist_ok=True)
    with open(os.path.join(RESULTS_DIR, "table4.txt"), "w") as f:
        f.write(text + "\n")
    print("\n" + text)
    by = {(r.dataset, r.approach): r for r in rows}
    # LP has no query log: HQI's layout (and so its build) matches
    # PreFilter's single-IVF build (§6.2).
    assert by[("LP", "hqi")].build_seconds > 0
