"""Competitor imputation methods (Section 6 comparisons).

In-Spark competitors (runtime benchmarks, Figure 4):
``mice_competitor`` models SystemDS (``madlib=False``) and MADlib
(``madlib=True``): one-hot preprocessing + O(w²) scalar-SQL cofactor +
direct solve, retrained from scratch. The MindsDB stand-in reuses the tree
ensemble from ``forest`` per column.

NumPy external-tool class (quality benchmarks, Figures 7/8):
``mice_python``, ``forest`` (MissForest), ``gain``, ``miracle``, ``midas`` —
each a reduced-scale reimplementation of the published algorithm, collected
to the driver like the real tools collect to local memory.
"""
from . import forest, gain, mice_python, midas, miracle
from .simple import impute_mean_mode
from .systemds_like import mice_competitor

__all__ = [
    "impute_mean_mode",
    "mice_competitor",
    "mice_python",
    "forest",
    "gain",
    "miracle",
    "midas",
]
