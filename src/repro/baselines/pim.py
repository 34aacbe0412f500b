"""PIM (Partwise Independence Model) — the Bayesian-model baseline of
Agarwal et al. [8], compared against in the paper's Exp-I (Table 1).

PIM avoids scanning the fact table at query time by precomputing, per
day, the measure total and the per-(dimension, value) marginal sums
(a one-dimensional cube per dimension — linear space). A constraint
``C = d1 ∈ V1 AND d2 ∈ V2 ...`` is then estimated under the
independence assumption:

    M̂(C, t) = Total_t · Π_j ( Σ_{v ∈ Vj} marginal[dj, v, t] / Total_t )

This is exact when the measure's conditional distribution factorizes
over dimensions, and biased otherwise — the ads generator deliberately
includes a gender×interest interaction, so PIM shows the systematic
error the paper reports (Table 1: PIM is the worst method by far).

The marginal cubes are built with one Spark pass per dimension over
the fact table (offline, like the paper's sample preprocessing), then
held driver-side: days × Σ_dim card(dim) values per measure — tiny.
"""
from __future__ import annotations

import numpy as np
from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.core.task import parse_where
from repro.synth_data import ADS_DIMS


class PIM:
    """Per-day partwise-independence estimator for SUM aggregations."""

    def __init__(self, df: DataFrame, measures: list[str], *, days: int):
        self.measures = list(measures)
        self.days = days
        sums = [F.sum(F.col(m).cast("double")).alias(m) for m in self.measures]
        # totals[m][t]
        self.totals: dict[str, np.ndarray] = {
            m: np.zeros(days) for m in self.measures
        }
        for r in df.groupBy("t").agg(*sums).collect():
            t = int(r["t"])
            if 0 <= t < days:
                for m in self.measures:
                    self.totals[m][t] = float(r[m] or 0.0)
        # marginals[m][dim][t, value]
        self.marginals: dict[str, dict[str, np.ndarray]] = {
            m: {d: np.zeros((days, card)) for d, card in ADS_DIMS.items()}
            for m in self.measures
        }
        for dim, card in ADS_DIMS.items():
            for r in df.groupBy("t", dim).agg(*sums).collect():
                t, v = int(r["t"]), int(r[dim])
                if 0 <= t < days and 0 <= v < card:
                    for m in self.measures:
                        self.marginals[m][dim][t, v] = float(r[m] or 0.0)

    def estimate_series(self, where: str | None, measure: str) -> np.ndarray:
        """M̂_t for t = 0..days-1 under partwise independence."""
        if measure not in self.measures:
            raise ValueError(f"measure {measure!r} not precomputed")
        total = self.totals[measure]
        est = total.copy()
        for pred in parse_where(where):
            marg = self.marginals[measure][pred.dim]
            mass = marg[:, sorted(pred.values)].sum(axis=1)
            ratio = np.divide(
                mass, total, out=np.zeros_like(mass), where=total != 0
            )
            est = est * ratio
        return est
