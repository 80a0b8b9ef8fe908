"""Union search as a BLEND plan (paper §VII-A).

"The Union discovery plan in BLEND comprises multiple SC seekers, one per
input table column, and one Counter combiner that aggregates the results
of these seekers. We choose a higher top-k limit for individual seekers
than the combiner."
"""
from __future__ import annotations

import pandas as pd

from ..core.plan import Combiners, Plan, Seekers


def build_union_plan(examples: pd.DataFrame, k: int = 10, k_sc: int = 100) -> Plan:
    """The paper's union-search sub-plan (Listing 4, lines 6–8)."""
    plan = Plan()
    for clm in examples.columns:
        plan.add(str(clm), Seekers.SC(list(examples[clm]), k=k_sc))
    plan.add("counter", Combiners.Counter(k=k), [str(c) for c in examples.columns])
    return plan
