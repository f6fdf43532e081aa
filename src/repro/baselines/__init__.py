"""Baselines from the paper's §VII-A3.

- :mod:`repro.baselines.featuretools_lite` — Featuretools-style exhaustive
  predicate-free aggregation features ("FT"),
- :mod:`repro.baselines.random_search` — the "Random" baseline (random
  templates + random pool queries),
- :mod:`repro.baselines.arda` — ARDA's random-injection feature selection
  (one-to-one tables),
- :mod:`repro.baselines.autofeature` — AutoFeature's MAB / DQN augmentation
  (one-to-one tables).
"""
from repro.baselines.arda import run_arda
from repro.baselines.autofeature import run_autofeature
from repro.baselines.featuretools_lite import featuretools_features
from repro.baselines.random_search import run_random

__all__ = ["featuretools_features", "run_arda", "run_autofeature", "run_random"]
