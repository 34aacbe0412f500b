"""spark-submit entrypoint for Exp-III / Figure 9 (training days sweep).

    spark-submit jobs/run_exp3.py [--sf 0.1 --days 165]
"""
from _runner import run_job
from repro.experiments.exp3_train_days import run_exp3

if __name__ == "__main__":
    run_job("exp3_train_days", lambda df, cfg: run_exp3(df, cfg))
