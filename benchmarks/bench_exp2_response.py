"""Benchmark for Exp-II / Figure 8: response-time breakdown.

Shape to reproduce: on full data the aggregation portion dominates the
end-to-end time; sampling cuts aggregation time sharply while the
model-fitting portion stays constant; LSTM fitting costs more than
ARIMA.
"""
import dataclasses

from benchmarks.conftest import save_result
from repro.experiments.common import load_ads
from repro.experiments.exp2_response import PAPER_EXP2, run_exp2


def test_exp2_response(benchmark, spark, bench_cfg):
    # Response time is the one experiment whose shape needs table size:
    # at SF=0.1 the ~300 ms per-query floor (plan compile + scheduling)
    # hides the scan cost. SF=0.4 (60k rows/day, ~10M rows) makes the
    # full-scan portion clearly dominate, as in the paper.
    cfg = dataclasses.replace(bench_cfg, sf=0.4)
    df = load_ads(spark, cfg)
    try:
        result = benchmark.pedantic(
            lambda: run_exp2(df, cfg, repeats=3), rounds=1, iterations=1
        )
    finally:
        df.unpersist()
    save_result("exp2_response", result, floatfmt="{:.1f}")
    save_result("exp2_paper", PAPER_EXP2, floatfmt="{:.1f}")

    full = result[result["source"] == "full"].iloc[0]
    sampled = result[result["source"] != "full"]
    # Every sampled source must aggregate faster than the full scan, and
    # the best sampled path must cut the aggregation portion materially.
    # (At the paper's scale — 1000× more rows/day — the full-scan portion
    # grows linearly while the sampled portion doesn't, which is where the
    # 20 s → 30 ms headline comes from; see EXPERIMENTS.md.)
    assert (sampled["agg_ms"] < full["agg_ms"]).all()
    assert sampled["agg_ms"].min() < 0.7 * full["agg_ms"]
    # The forecasting portion is sampling-rate independent (fixed t₀).
    assert sampled["arima_ms"].max() < 3 * sampled["arima_ms"].min() + 100
