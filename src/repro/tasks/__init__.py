"""Complex discovery tasks (paper §VIII-B, Table III) — each implemented
as a BLEND plan and as a federation of stand-alone baselines."""
from .feature_discovery import baseline_feature_discovery, build_feature_discovery_plan
from .imputation import baseline_imputation, build_imputation_plan
from .loc import loc
from .multi_objective import baseline_multi_objective, build_multi_objective_plan
from .negative_examples import baseline_negative_examples, build_negative_examples_plan
from .union_search import build_union_plan

__all__ = [
    "build_negative_examples_plan",
    "baseline_negative_examples",
    "build_imputation_plan",
    "baseline_imputation",
    "build_feature_discovery_plan",
    "baseline_feature_discovery",
    "build_multi_objective_plan",
    "baseline_multi_objective",
    "build_union_plan",
    "loc",
]
