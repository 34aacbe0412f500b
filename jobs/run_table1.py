"""spark-submit entrypoint for Exp-I / Table 1.

    spark-submit jobs/run_table1.py [--sf 0.1 --days 165 --n-tasks 5]
"""
from _runner import run_job
from repro.experiments.table1 import run_table1

if __name__ == "__main__":
    run_job("table1", lambda df, cfg: run_table1(df, cfg, rate=0.05))
