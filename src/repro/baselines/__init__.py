"""Baseline systems the paper compares SPFresh against (§5.1).

- :mod:`repro.baselines.spann_plus` — SPANN+: append-only SPFresh
  (no Local Rebuilder; background GC only).
- :mod:`repro.baselines.static_index` — Static: index rebuilt globally
  from the current live vector set (the paper's ideal reference and the
  global-rebuild cost probe for Table 1).
- :mod:`repro.baselines.diskann` — DiskANN/FreshDiskANN: Vamana graph
  with out-of-place updates (delta list + tombstones + streamingMerge).
"""
