"""BLEND's core: unified index, seekers, combiners, plans, optimizer."""
from .combiners import Counter, Difference, Intersect, Union
from .cost_model import CostModel, rank_seekers, train_cost_model
from .executor import PlanResult, execute_plan
from .index import BlendIndex, build_index
from .plan import Combiners, Plan, Seekers
from .seekers import C, KW, MC, SC

__all__ = [
    "BlendIndex",
    "build_index",
    "Plan",
    "Seekers",
    "Combiners",
    "SC",
    "KW",
    "MC",
    "C",
    "Intersect",
    "Union",
    "Difference",
    "Counter",
    "CostModel",
    "train_cost_model",
    "rank_seekers",
    "execute_plan",
    "PlanResult",
]
