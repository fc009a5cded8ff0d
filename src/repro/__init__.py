"""Reproduction of "Adaptive Wavelet Clustering for Highly Noisy Data"
(AdaWave, ICDE 2019) on PySpark.

Subpackages:

- :mod:`repro.core` — the AdaWave pipeline (quantize → sparse DWT →
  adaptive threshold → connected components → label join).
- :mod:`repro.metrics` — adjusted mutual information (from scratch).
- :mod:`repro.stats` — Hartigan dip test (from scratch).
- :mod:`repro.baselines` — the paper's seven comparison clusterers.
- :mod:`repro.datasets` — the synthetic benchmark and UCI-like stand-ins.
- :mod:`repro.harness` — one runner per table/figure of the paper.
"""
