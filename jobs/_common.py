"""Shared glue for the spark-submit job entrypoints."""
from __future__ import annotations

import argparse
import os
import sys

# Editable-install fallback (see conftest.py): make src/ importable for
# the driver and for Spark's Python workers.
_SRC = os.path.join(os.path.dirname(os.path.abspath(__file__)), "..", "src")
_SRC = os.path.abspath(_SRC)
if _SRC not in sys.path:
    sys.path.insert(0, _SRC)
os.environ["PYTHONPATH"] = (
    _SRC + os.pathsep + os.environ["PYTHONPATH"]
    if os.environ.get("PYTHONPATH")
    else _SRC
)

from pyspark.sql import SparkSession  # noqa: E402

from repro.bench.config import SCALES, Scale  # noqa: E402


def get_spark(app: str) -> SparkSession:
    return (
        SparkSession.builder.appName(app)
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        # Tiny-data shuffles: 200 partitions would be pure scheduling
        # overhead and drown the compute being measured.
        .config("spark.sql.shuffle.partitions", "32")
        .getOrCreate()
    )


def parse_scale(description: str) -> Scale:
    ap = argparse.ArgumentParser(description=description)
    ap.add_argument(
        "--scale", choices=sorted(SCALES), default="bench",
        help="workload scale preset (see repro.bench.config)",
    )
    args = ap.parse_args()
    return SCALES[args.scale]
