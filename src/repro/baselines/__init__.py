"""Comparison region-detection strategies (Sec. 5.2).

- :mod:`repro.baselines.connected_components` -- Coletta et al.'s
  WebSmatch-style table discovery (each connected component = a region);
  also Mondrian's own pre-clustering stage.
- :mod:`repro.baselines.genetic` -- Koci et al.'s genetic-based table
  recognition, rebuilt as cell-role classification (+ optional Excel
  style features) feeding a genetic search over row partitions.
- :mod:`repro.baselines.tablesense` -- TableSense surrogate: dense-block
  proposals + objectness thresholding + boundary refinement, with the
  stochastic miss behaviour the paper reports.
"""
