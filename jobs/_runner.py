"""Shared spark-submit runner for the experiment jobs.

Each job builds one SparkSession (mirroring the conftest settings),
loads the benchmark-scale ads relation, runs its experiment harness,
prints the paper-style table, and writes it to results/.
"""
from __future__ import annotations

import argparse
import os
import sys

from pyspark.sql import SparkSession

sys.path.insert(0, os.path.join(os.path.dirname(__file__), "..", "src"))

from repro.experiments.common import ExpConfig, fmt_table, load_ads  # noqa: E402

RESULTS_DIR = os.path.join(os.path.dirname(__file__), "..", "results")


def build_session(app: str) -> SparkSession:
    return (
        SparkSession.builder.appName(app)
        .config("spark.sql.shuffle.partitions", "64")
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .getOrCreate()
    )


def run_job(name: str, harness, *, floatfmt: str = "{:.3f}") -> None:
    """Parse common CLI args, run ``harness(df, cfg)``, print + save."""
    ap = argparse.ArgumentParser(description=f"FlashP reproduction job: {name}")
    ap.add_argument("--sf", type=float, default=0.1)
    ap.add_argument("--days", type=int, default=165)
    ap.add_argument("--train-days", type=int, default=150)
    ap.add_argument("--n-tasks", type=int, default=3)
    ap.add_argument("--seed", type=int, default=7)
    args = ap.parse_args()

    cfg = ExpConfig(
        sf=args.sf, days=args.days, train_days=args.train_days,
        n_tasks=args.n_tasks, seed=args.seed,
    )
    spark = build_session(f"flashp-{name}")
    spark.sparkContext.setLogLevel("WARN")
    try:
        df = load_ads(spark, cfg)
        result = harness(df, cfg)
        text = fmt_table(result, floatfmt=floatfmt)
        print(f"\n===== {name} =====\n{text}\n")
        os.makedirs(RESULTS_DIR, exist_ok=True)
        with open(os.path.join(RESULTS_DIR, f"{name}.txt"), "w") as f:
            f.write(text + "\n")
    finally:
        spark.stop()
