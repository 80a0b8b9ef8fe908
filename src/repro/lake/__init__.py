"""Synthetic data-lake substrate with planted ground truth (see DESIGN.md)."""
from .base import DataLake
from .corr_bench import corr_lake, exact_topk
from .generator import add_tpch_slices, sample_mc_query, webtable_lake
from .union_bench import union_lake

__all__ = [
    "DataLake",
    "corr_lake",
    "exact_topk",
    "webtable_lake",
    "add_tpch_slices",
    "sample_mc_query",
    "union_lake",
]
