"""MinoanER reproduction (EDBT 2019) — schema-agnostic, non-iterative,
massively parallel entity resolution, rebuilt on PySpark DataFrames.

Packages: ``core`` (the paper's contribution), ``kbgen`` (synthetic KB
substrate), ``baselines`` (BSL / SiGMa-lite / PARIS-lite / UMC),
``tables`` (Table 1-4 harnesses). See DESIGN.md for the full map.
"""
