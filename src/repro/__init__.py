"""Reproduction of FlashP (VLDB 2021): real-time forecasting of
time-series relational data via GSW sampling. See DESIGN.md."""
