"""The paper's core contribution: metric computation by BSI arithmetic.

- :mod:`repro.core.metrics105` — the synthetic 105-core-metric catalog
  (Tables 3/5) and the A/B/C typical metrics (Tables 5/6).
- :mod:`repro.core.scorecard` — scorecard computation (§4.2), BSI and
  normal-format Spark pipelines.
- :mod:`repro.core.preexperiment` — pre-experiment/CUPED (§4.3).
- :mod:`repro.core.deepdive` — dimension-filtered deep dives (§4.4).
- :mod:`repro.core.stats` — bucket-based statistical inference (§3.3).
"""
