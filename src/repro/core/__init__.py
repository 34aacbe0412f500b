"""The paper's core: GSW sampling, per-day estimation, the forecast
task language, measure grouping, and the end-to-end pipeline."""
