"""spark-submit entrypoint for Exp-II / Figure 8 (response time).

Uses SF=0.4 by default (~10M rows): at smaller scale the per-query plan
compile + scheduling floor (~300 ms) hides the full-scan cost and the
paper's bottleneck shape does not show.

    spark-submit jobs/run_exp2.py [--sf 0.4 --days 165]
"""
import sys

from _runner import run_job
from repro.experiments.exp2_response import run_exp2

if __name__ == "__main__":
    if not any(a.startswith("--sf") for a in sys.argv[1:]):
        sys.argv.extend(["--sf", "0.4"])
    run_job("exp2_response", lambda df, cfg: run_exp2(df, cfg), floatfmt="{:.1f}")
