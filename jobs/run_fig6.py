"""spark-submit entrypoint for the §4.2 grouping evaluation / Figure 6.

    spark-submit jobs/run_fig6.py [--sf 0.1 --days 165]
"""
from _runner import run_job
from repro.experiments.fig6_grouping import run_fig6

if __name__ == "__main__":
    run_job("fig6_grouping", lambda df, cfg: run_fig6(df, cfg, rate=0.02))
