"""Wavelet filter banks and the sparse d-dimensional low-pass DWT.

AdaWave only ever keeps the *average* subband (the LL…L approximation), so
the transform reduces to: convolve with the low-pass analysis filter and
downsample by 2, once per (dimension x level) — Mallat's algorithm
restricted to the scale space. The container has no PyWavelets, so the
analysis low-pass coefficients are hard-coded from the literature.

Two implementations, cross-checked in tests:

- :func:`dwt_dense` — numpy reference on a dense d-dim density array.
- :func:`dwt_spark` — the production path on the sparse ``{cell: density}``
  grid as a Spark DataFrame: each non-zero cell is exploded over the filter
  taps, taps whose output index is non-integral are dropped (the
  downsample-by-2 parity check), and contributions are merged with a
  ``groupBy().sum()``. One narrow+shuffle pass per (dimension x level).

Filters are center-aligned so that the dominant tap maps original cell
``i`` to transformed cell ``floor(i / 2)`` — which is exactly the lookup
table AdaWave needs to map objects back from the transformed space.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np
from pyspark.sql import DataFrame
from pyspark.sql import functions as F

__all__ = ["Wavelet", "WAVELETS", "get_wavelet", "dwt_dense", "dwt_spark", "cell_cols"]

_SQRT2 = float(np.sqrt(2.0))


@dataclass(frozen=True)
class Wavelet:
    """A low-pass analysis filter with a center tap for phase alignment.

    ``taps[center]`` is the tap that keeps cell ``i`` at output ``i // 2``;
    output index for tap ``m`` is ``(i + center - m) / 2`` when integral.
    """

    name: str
    taps: tuple[float, ...]
    center: int

    @property
    def max_fanout(self) -> int:
        """Upper bound on output cells one input cell can touch per pass."""
        return (len(self.taps) + 1) // 2


WAVELETS: dict[str, Wavelet] = {
    # Haar: the only filter with fanout 1 — mandatory for high-d data,
    # since fanout^d otherwise blows up the sparse grid.
    "haar": Wavelet("haar", (1.0 / _SQRT2, 1.0 / _SQRT2), 0),
    # Daubechies-2 (4-tap). "Daubechies" in the paper's Section IV-B.
    "db2": Wavelet(
        "db2",
        (
            (1 + np.sqrt(3.0)) / (4 * _SQRT2),
            (3 + np.sqrt(3.0)) / (4 * _SQRT2),
            (3 - np.sqrt(3.0)) / (4 * _SQRT2),
            (1 - np.sqrt(3.0)) / (4 * _SQRT2),
        ),
        1,
    ),
    # Cohen-Daubechies-Feauveau (2,2): the 5/3 LeGall analysis low-pass.
    "cdf2.2": Wavelet(
        "cdf2.2",
        (
            -0.125 * _SQRT2,
            0.25 * _SQRT2,
            0.75 * _SQRT2,
            0.25 * _SQRT2,
            -0.125 * _SQRT2,
        ),
        2,
    ),
    # Cohen-Daubechies-Feauveau (4,2): 9-tap analysis low-pass
    # (coefficients as in bior2.4's decomposition filter).
    "cdf4.2": Wavelet(
        "cdf4.2",
        (
            0.033145630368119419 * 1.0,
            -0.066291260736238838 * 1.0,
            -0.17677669529663689 * 1.0,
            0.41984465132951254 * 1.0,
            0.99436891104358249 * 1.0,
            0.41984465132951254 * 1.0,
            -0.17677669529663689 * 1.0,
            -0.066291260736238838 * 1.0,
            0.033145630368119419 * 1.0,
        ),
        4,
    ),
}


def get_wavelet(name: str | Wavelet) -> Wavelet:
    """Resolve a wavelet by name (or pass through a Wavelet instance)."""
    if isinstance(name, Wavelet):
        return name
    try:
        return WAVELETS[name]
    except KeyError:
        raise ValueError(f"unknown wavelet {name!r}; available: {sorted(WAVELETS)}") from None


def cell_cols(d: int) -> list[str]:
    """Canonical names of the grid-coordinate columns for d dimensions."""
    return [f"c{i}" for i in range(d)]


def _dwt_dense_1d(
    a: np.ndarray, w: Wavelet, axis: int, origin: int
) -> tuple[np.ndarray, int]:
    """Low-pass + downsample along one axis of a dense array (zero padding).

    ``origin`` is the true grid coordinate of array index 0 on this axis —
    it must be carried across levels because the downsample-by-2 parity is
    defined on *coordinates*, not array indices (the sparse Spark path
    works in coordinates natively). Returns (array, new origin).
    """
    a = np.moveaxis(a, axis, 0)
    n = a.shape[0]
    coords = origin + np.arange(n)
    # reachable output coordinates: k = (i + center - m) / 2, parity-valid;
    # the smallest is ceil((first_coord + center - (L-1)) / 2)
    lo = int(coords[0]) + w.center - (len(w.taps) - 1)
    k_min = -((-lo) // 2)
    k_max = (int(coords[-1]) + w.center) // 2
    out = np.zeros((k_max - k_min + 1,) + a.shape[1:], dtype=np.float64)
    for idx, i in enumerate(coords):
        for m, h in enumerate(w.taps):
            num = int(i) + w.center - m
            if num % 2 == 0:
                k = num // 2
                if k_min <= k <= k_max:
                    out[k - k_min] += h * a[idx]
    return np.moveaxis(out, 0, axis), k_min


def dwt_dense(
    a: np.ndarray, wavelet: str | Wavelet = "haar", levels: int = 1
) -> np.ndarray:
    """Reference d-dim approximation-subband DWT on a dense density array.

    Returns only the density values (the coordinate origin of index 0 is
    internal); tests compare value multisets against the sparse path.
    """
    w = get_wavelet(wavelet)
    out = np.asarray(a, dtype=np.float64)
    origins = [0] * out.ndim
    for _ in range(levels):
        for axis in range(out.ndim):
            out, origins[axis] = _dwt_dense_1d(out, w, axis, origins[axis])
    return out


def dwt_spark(
    grid: DataFrame,
    d: int,
    wavelet: str | Wavelet = "haar",
    levels: int = 1,
    density_col: str = "density",
) -> DataFrame:
    """Sparse approximation-subband DWT of a quantized grid DataFrame.

    ``grid`` has integer columns ``c0..c{d-1}`` and a double ``density``.
    Returns a DataFrame of the same shape holding the transformed grid.
    Transformed coordinates relate to originals by ``t_j = c_j >> levels``
    for the dominant tap (the lookup-table mapping).
    """
    w = get_wavelet(wavelet)
    taps = F.array(
        *[
            F.struct(F.lit(m).alias("m"), F.lit(float(h)).alias("h"))
            for m, h in enumerate(w.taps)
        ]
    )
    cols = cell_cols(d)
    out = grid
    for _ in range(levels):
        for j, cj in enumerate(cols):
            num = F.col(cj) + F.lit(w.center) - F.col("tap.m")
            out = (
                out.select(*cols, density_col, F.explode(taps).alias("tap"))
                .where(num % 2 == 0)
                .withColumn(cj, (num / 2).cast("long"))
                .groupBy(*cols)
                .agg(F.sum(F.col(density_col) * F.col("tap.h")).alias(density_col))
            )
    return out
