"""Step 1 of AdaWave: quantize the feature space into a sparse grid.

This is the "grid labeling" data structure of the paper (Section IV-A):
only cells with non-zero density are materialized, which is what lets the
algorithm scale past 2-3 dimensions. In Spark it is a pure Catalyst plan:
a min/max aggregate per dimension, a projection computing the integer cell
coordinate per dimension, and a ``groupBy(cells).count()``.

The per-object cell coordinates are also returned (``assign_cells``) —
AdaWave's final step joins cluster labels back onto them.
"""
from __future__ import annotations

from dataclasses import dataclass

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.core.wavelet import cell_cols

__all__ = ["GridSpec", "fit_grid", "assign_cells", "grid_densities", "quantize"]


@dataclass(frozen=True)
class GridSpec:
    """Per-dimension [min, max] bounds plus the number of intervals."""

    features: tuple[str, ...]
    mins: tuple[float, ...]
    maxs: tuple[float, ...]
    scale: int

    @property
    def d(self) -> int:
        return len(self.features)

    def width(self, j: int) -> float:
        span = self.maxs[j] - self.mins[j]
        # A constant dimension still needs a non-zero cell width.
        return (span if span > 0 else 1.0) / self.scale


def fit_grid(df: DataFrame, features: list[str], scale: int) -> GridSpec:
    """Compute per-dimension bounds with a single aggregate pass."""
    if scale < 2:
        raise ValueError(f"scale must be >= 2, got {scale}")
    if not features:
        raise ValueError("no feature columns given")
    aggs = []
    for f in features:
        aggs += [F.min(f).alias(f"min_{f}"), F.max(f).alias(f"max_{f}")]
    row = df.agg(*aggs).first()
    mins = tuple(float(row[f"min_{f}"]) for f in features)
    maxs = tuple(float(row[f"max_{f}"]) for f in features)
    return GridSpec(tuple(features), mins, maxs, scale)


def assign_cells(df: DataFrame, spec: GridSpec) -> DataFrame:
    """Add integer cell-coordinate columns ``c0..c{d-1}`` to ``df``.

    The right-open interval convention of the paper means the maximum value
    of a dimension would land in cell ``scale``; it is clamped into the last
    cell, matching WaveCluster.
    """
    out = df
    for j, f in enumerate(spec.features):
        cell = F.floor((F.col(f) - F.lit(spec.mins[j])) / F.lit(spec.width(j)))
        cell = F.least(F.greatest(cell, F.lit(0)), F.lit(spec.scale - 1))
        out = out.withColumn(f"c{j}", cell.cast("long"))
    return out


def grid_densities(cells: DataFrame, d: int) -> DataFrame:
    """Sparse grid: one row per occupied cell with its object count."""
    return (
        cells.groupBy(*cell_cols(d))
        .agg(F.count(F.lit(1)).cast("double").alias("density"))
    )


def quantize(
    df: DataFrame, features: list[str], scale: int
) -> tuple[DataFrame, DataFrame, GridSpec]:
    """One-call convenience: returns (df+cells, sparse grid, spec)."""
    spec = fit_grid(df, features, scale)
    cells = assign_cells(df, spec)
    return cells, grid_densities(cells, spec.d), spec
