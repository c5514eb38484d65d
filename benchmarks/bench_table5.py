"""Benchmark target regenerating Table 5 (robustness to future queries):
HQI trained on split t0 only, QPS measured on splits t0..t3."""
import os

from repro.bench.config import current_scale
from repro.bench.report import format_table5
from repro.bench.robustness import run_robustness

RESULTS_DIR = os.path.join(os.path.dirname(__file__), "..", "bench_results")


def test_table5_robustness(spark, benchmark):
    scale = current_scale()
    rows = benchmark.pedantic(
        lambda: run_robustness(spark, scale), rounds=1, iterations=1
    )
    text = (
        "Table 5 (reproduction): QPS by temporal split, normalized by HQI @ t0\n"
        + format_table5(rows)
    )
    os.makedirs(RESULTS_DIR, exist_ok=True)
    with open(os.path.join(RESULTS_DIR, "table5.txt"), "w") as f:
        f.write(text + "\n")
    print("\n" + text)
    hqi = next(r for r in rows if r.approach == "hqi")
    pre = next(r for r in rows if r.approach == "prefilter")
    # Filter stability: HQI's QPS stays roughly flat across unseen splits
    # (paper: <=5% drift; sub-second timings here add measurement noise).
    assert max(hqi.qps) / min(hqi.qps) < 1.6
    # HQI stays faster than PreFilter on every split.
    assert all(h > p for h, p in zip(hqi.qps, pre.qps))
