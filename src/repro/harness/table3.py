"""Table III: complex discovery tasks — runtime, LOC, #systems, #indexes
for BLEND (optimized), B-NO (no optimizer) and the federated baselines.

One combined lake (webtable joinable groups + union splits + correlation
candidates) is indexed once by BLEND; each stand-alone baseline builds its
own index over the same lake, exactly the federation scenario of §VIII-B.
"""
from __future__ import annotations

import numpy as np
import pandas as pd

from ..baselines import CsvStore, Josie, Mate, QcrSketch, Starmie
from ..core import build_index, execute_plan
from ..core.index import BlendIndex
from ..lake import DataLake, corr_lake, union_lake, webtable_lake
from ..lake.corr_bench import region_of
from ..tasks import (
    baseline_feature_discovery,
    baseline_imputation,
    baseline_multi_objective,
    baseline_negative_examples,
    build_feature_discovery_plan,
    build_imputation_plan,
    build_multi_objective_plan,
    build_negative_examples_plan,
    loc,
)
from .common import mean

# bench sizes are chosen so the federated baselines' actual bottleneck —
# row-by-row application-level validation over candidate tables (§VIII-B)
# — involves tens of thousands of row visits per query, as it does (at
# larger absolute scale) in the paper's setting.
SCALES = {
    "test": dict(n_groups=3, n_base=3, n_corr=2, n_q=2, reps=6,
                 entity_rows=140, rows=(30, 80), n_neg=6, group_size=3),
    "bench": dict(n_groups=6, n_base=6, n_corr=4, n_q=4, reps=14,
                  entity_rows=500, rows=(200, 380), n_neg=60, group_size=8),
}


def build_combined_lake(scale: str = "bench", seed: int = 100) -> DataLake:
    p = SCALES[scale]
    lake = webtable_lake(
        n_groups=p["n_groups"], tables_per_group=p["group_size"],
        entity_rows=p["entity_rows"],
        rows_per_table=p["rows"], n_noise_tables=6, seed=seed,
    )
    lake.absorb(union_lake(
        n_base=p["n_base"], segments_per_base=5, rows_per_segment=25,
        semantic_frac=0.2, n_distractors=6, seed=seed + 1,
    ))
    lake.absorb(corr_lake(
        n_cat_queries=p["n_corr"], n_num_queries=0, n_keys=24,
        reps_per_key=p["reps"], candidates_per_query=8, n_distractors=4,
        seed=seed + 2,
    ))
    return lake


# --- per-task workload generation + execution ---------------------------

def _neg_examples_workload(lake: DataLake, n_q: int, g: np.random.Generator,
                           n_neg: int = 6):
    """Positive tuples shared across a planted group; negatives from a
    disjoint entity-row subset (present in some members -> must be dropped)."""
    out = []
    groups = lake.meta["groups"]
    gids = list(groups)
    for i in range(n_q):
        gid = gids[int(g.integers(0, len(gids)))]
        ent = lake.meta["entities"][gid]
        rows = g.choice(len(ent), size=6 + n_neg, replace=False)
        examples = ent.iloc[sorted(rows[:6]), [0, 1]].reset_index(drop=True)
        negatives = ent.iloc[sorted(rows[6:]), [0, 1]].reset_index(drop=True)
        out.append((examples, negatives))
    return out


def _imputation_workload(lake: DataLake, n_q: int, g: np.random.Generator):
    out = []
    groups = lake.meta["groups"]
    gids = list(groups)
    for i in range(n_q):
        gid = gids[int(g.integers(0, len(gids)))]
        members = groups[gid]
        tid = members[int(g.integers(0, len(members)))]
        df = lake.tables[tid]
        examples = df.iloc[:5, [0, 1]].reset_index(drop=True)
        queries = list(df.iloc[5:, 0])
        out.append((examples, queries))
    return out


def _feature_discovery_workload(lake: DataLake, n_q: int, g: np.random.Generator):
    out = []
    qs = [q for q in lake.meta["corr_queries"] if q["key_kind"] == "cat"]
    for i in range(n_q):
        q = qs[i % len(qs)]
        keys = q["keys"]
        target = [q["target"][k] for k in keys]
        t = np.asarray(target)
        feats = [
            list(0.9 * t + 0.3 * g.normal(0, 1, len(t))),  # strongly collinear
            list(g.normal(0, 1, len(t))),  # independent
        ]
        sub = [keys[j] for j in g.choice(len(keys), size=8, replace=False)]
        key_query = pd.DataFrame({"join_key": sub, "region": [region_of(k) for k in sub]})
        out.append((keys, target, feats, key_query))
    return out


def _multi_objective_workload(lake: DataLake, n_q: int, g: np.random.Generator):
    out = []
    queries = lake.meta["queries"]
    corr_qs = lake.meta["corr_queries"]
    values = [
        v for df in list(lake.tables.values())[:40]
        for v in df.iloc[:, 0].astype(str).tolist()
    ]
    for i in range(n_q):
        qtid = queries[i % len(queries)]
        examples = lake.tables[qtid]
        kws = [values[int(g.integers(0, len(values)))] for _ in range(5)]
        cq = corr_qs[i % len(corr_qs)]
        keys = cq["keys"]
        target = [cq["target"][k] for k in keys]
        out.append((kws, examples, qtid, keys, target))
    return out


def _time_pair(plan, index, i: int) -> tuple[float, float]:
    """Time BLEND and B-NO for one query, alternating which runs first so
    neither systematically benefits from warmed Catalyst/JIT state."""
    if i % 2 == 0:
        bl = execute_plan(plan, index, optimize=True).seconds
        bn = execute_plan(plan, index, optimize=False).seconds
    else:
        bn = execute_plan(plan, index, optimize=False).seconds
        bl = execute_plan(plan, index, optimize=True).seconds
    return bl, bn


def run_table3(spark, scale: str = "bench", k: int = 10, seed: int = 100) -> list[dict]:
    """Produce the Table III rows (one dict per complex task)."""
    p = SCALES[scale]
    g = np.random.default_rng(seed)
    lake = build_combined_lake(scale, seed)
    index: BlendIndex = build_index(spark, lake, view="AllTablesT3")
    store = CsvStore(lake)  # federated baselines pay cross-system loading
    mate, josie = Mate(lake, store=store), Josie(lake)
    qcr, star = QcrSketch(lake), Starmie(lake)
    n_q = p["n_q"]
    rows = []

    # --- 1. negative examples
    bl, bn, ba = [], [], []
    warm = _neg_examples_workload(lake, 1, np.random.default_rng(seed + 99), p["n_neg"])[0]
    execute_plan(build_negative_examples_plan(*warm, k), index)  # JIT warm-up
    for i, (examples, negatives) in enumerate(
        _neg_examples_workload(lake, n_q, g, p["n_neg"])
    ):
        plan = build_negative_examples_plan(examples, negatives, k)
        s_bl, s_bn = _time_pair(plan, index, i)
        bl.append(s_bl)
        bn.append(s_bn)
        ba.append(baseline_negative_examples(lake, mate, examples, negatives, k, store=store)[1])
    rows.append(_row("With Negative Examples", bl, bn, ba,
                     build_negative_examples_plan, baseline_negative_examples, 1))

    # --- 2. data imputation
    bl, bn, ba = [], [], []
    for i, (examples, queries) in enumerate(_imputation_workload(lake, n_q, g)):
        plan = build_imputation_plan(examples, queries, k)
        s_bl, s_bn = _time_pair(plan, index, i)
        bl.append(s_bl)
        bn.append(s_bn)
        ba.append(baseline_imputation(mate, josie, examples, queries, k)[1])
    rows.append(_row("Data Imputation", bl, bn, ba,
                     build_imputation_plan, baseline_imputation, 2))

    # --- 3. feature discovery
    bl, bn, ba = [], [], []
    for i, (keys, target, feats, key_query) in enumerate(
        _feature_discovery_workload(lake, n_q, g)
    ):
        plan = build_feature_discovery_plan(keys, target, feats, key_query, k)
        s_bl, s_bn = _time_pair(plan, index, i)
        bl.append(s_bl)
        bn.append(s_bn)
        ba.append(baseline_feature_discovery(qcr, mate, keys, target, feats, key_query, k)[1])
    rows.append(_row("Feature Discovery", bl, bn, ba,
                     build_feature_discovery_plan, baseline_feature_discovery, 2))

    # --- 4. multi-objective discovery
    bl, bn, ba = [], [], []
    for i, (kws, examples, qtid, keys, target) in enumerate(
        _multi_objective_workload(lake, n_q, g)
    ):
        plan = build_multi_objective_plan(kws, examples, keys, target, k)
        s_bl, s_bn = _time_pair(plan, index, i)
        bl.append(s_bl)
        bn.append(s_bn)
        ba.append(baseline_multi_objective(josie, star, qcr, kws, qtid, keys, target, k)[1])
    rows.append(_row("Multi-Objective Discovery", bl, bn, ba,
                     build_multi_objective_plan, baseline_multi_objective, 3))
    return rows


def _row(task, bl, bn, ba, plan_fn, baseline_fn, n_sys) -> dict:
    return {
        "Task": task,
        "BLEND Runtime (s)": mean(bl),
        "B-NO Runtime (s)": mean(bn),
        "Baseline Runtime (s)": mean(ba),
        "BLEND LOC": loc(plan_fn),
        "Baseline LOC": loc(baseline_fn),
        "# Systems (BLEND/Baseline)": f"1/{n_sys}",
        "# Indexes (BLEND/Baseline)": "Single/Multi",
    }
