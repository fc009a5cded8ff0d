"""Fig. 8: AMI vs noise percentage on the paper's synthetic benchmark.

Although figures are out of scope for number-matching, this sweep is the
paper's primary quantitative claim (AdaWave dominates every baseline from
20 % to 90 % noise and degrades gracefully), so the harness reproduces it
and EXPERIMENTS.md records the curve's shape against the paper's
description.

Protocol (Section V-B): five clusters of ``n_per_cluster`` objects,
uniform noise at gamma = 20..90 %; AdaWave parameter-free; DBSCAN
automated with minPts=8 and the best eps in {0.01..0.2}; k-means/EM get
the correct k; AMI scored on the non-noise objects only.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import SparkSession

from repro.datasets.synthetic import paper_synthetic
from repro.harness.common import run_algo
from repro.metrics.ami import ami

__all__ = ["PAPER_FIG8_SHAPE", "run_fig8", "DEFAULT_GAMMAS"]

DEFAULT_GAMMAS = (0.2, 0.3, 0.4, 0.5, 0.6, 0.7, 0.8, 0.9)
FIG8_ALGOS = ("adawave", "skinnydip", "dbscan", "em", "kmeans", "stsc", "dipmeans", "ric")

# Qualitative anchors read off the paper (Figs 2/8 and Section VI):
# AdaWave ~0.76 at 50 % noise and stays on top of every baseline across
# the sweep; DBSCAN declines sharply past 20 % noise; k-means ~0.25;
# SkinnyDip mid-pack (clusters are not unimodal per dimension); RIC ~0.
PAPER_FIG8_SHAPE = {
    "adawave_at_50": 0.76,
    "kmeans_running_example": 0.25,
    "dbscan_running_example": 0.28,
}


def run_fig8(
    spark: SparkSession,
    *,
    gammas: tuple[float, ...] = DEFAULT_GAMMAS,
    algorithms: tuple[str, ...] = FIG8_ALGOS,
    n_per_cluster: int = 5600,
    seed: int = 0,
) -> pd.DataFrame:
    """One row per (gamma, algorithm): AMI on non-noise points + runtime."""
    rows = []
    for gamma in gammas:
        X, y = paper_synthetic(gamma, n_per_cluster=n_per_cluster, seed=seed)
        eval_mask = y >= 0
        for algo in algorithms:
            res = run_algo(
                spark, algo, X, y,
                k_true=5, eval_mask=eval_mask, assign_noise=False, seed=seed,
            )
            score = ami(y[eval_mask], res.labels[eval_mask])
            rows.append(
                {
                    "gamma": gamma,
                    "algorithm": algo,
                    "ami": round(float(score), 3),
                    "n": len(X),
                    "seconds": round(res.seconds, 2),
                    "capped": res.capped,
                }
            )
    return pd.DataFrame(rows)
