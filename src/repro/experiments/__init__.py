"""Experiment harnesses reproducing the data series of Figures 2-8.

Each ``tableN_*`` module exposes a ``run(...)`` returning a pandas
DataFrame with the same rows the paper's figure reports (dataset x
parameter sweep x metric), plus a ``main`` used by the matching
``jobs/tableN_*.py`` entrypoint. ``common`` holds the shared bookkeeping:
the empirical approximation ratio (radius / best radius found across the
sweep, as defined in Section 5), shuffling, and table formatting.
"""
