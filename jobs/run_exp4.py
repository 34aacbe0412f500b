"""spark-submit entrypoint for Exp-IV / Figures 10–15 (sampler sweep).

Runs the sweep for both measures the paper plots (Favorite and
Impression) with ARIMA, plus Favorite with LSTM.

    spark-submit jobs/run_exp4.py [--sf 0.1 --days 165]
"""
import pandas as pd

from _runner import run_job
from repro.experiments.exp4_sweep import run_exp4


def harness(df, cfg):
    parts = [
        run_exp4(df, cfg, measure="favorite", model="arima"),
        run_exp4(df, cfg, measure="impression", model="arima"),
        run_exp4(df, cfg, measure="favorite", model="lstm"),
    ]
    return pd.concat(parts, ignore_index=True)


if __name__ == "__main__":
    run_job("exp4_sweep", harness)
