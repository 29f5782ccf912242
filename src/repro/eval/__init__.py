"""Evaluation harnesses: quality metrics + per-table experiment runners."""
from .quality import downstream_quality, normalized_rmse, split_train_test
from .tables import (
    rows_to_markdown,
    table3_learning,
    table4_single_table,
    table5_ncols,
    table6_normalized,
    table7_quality,
    table8_patterns,
)

__all__ = [
    "downstream_quality",
    "normalized_rmse",
    "split_train_test",
    "rows_to_markdown",
    "table3_learning",
    "table4_single_table",
    "table5_ncols",
    "table6_normalized",
    "table7_quality",
    "table8_patterns",
]
