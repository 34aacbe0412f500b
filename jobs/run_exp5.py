"""spark-submit entrypoint for Exp-V / Figure 16 (space at matched accuracy).

    spark-submit jobs/run_exp5.py [--sf 0.1 --days 165]
"""
from _runner import run_job
from repro.experiments.exp5_space import run_exp5

if __name__ == "__main__":
    run_job("exp5_space", lambda df, cfg: run_exp5(df, cfg, verify_rate=0.02))
