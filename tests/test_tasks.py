"""Integration tests for the complex discovery tasks (Table III, §VIII-B)."""
import numpy as np
import pandas as pd
import pytest

from repro.baselines import CsvStore, Josie, Mate, QcrSketch, Starmie
from repro.core import execute_plan
from repro.lake.corr_bench import region_of
from repro.tasks import (
    baseline_feature_discovery,
    baseline_imputation,
    baseline_multi_objective,
    baseline_negative_examples,
    build_feature_discovery_plan,
    build_imputation_plan,
    build_multi_objective_plan,
    build_negative_examples_plan,
    build_union_plan,
    loc,
)


# --- negative examples --------------------------------------------------

@pytest.fixture(scope="module")
def neg_workload(tiny_lake):
    ent = tiny_lake.meta["entities"][0]
    examples = ent.iloc[:5, [0, 1]].reset_index(drop=True)
    negatives = ent.iloc[10:14, [0, 1]].reset_index(drop=True)
    return examples, negatives


def test_negative_examples_blend_vs_baseline(tiny_lake, tiny_index, neg_workload):
    examples, negatives = neg_workload
    plan = build_negative_examples_plan(examples, negatives, k=10)
    res = execute_plan(plan, tiny_index, optimize=True)
    base, _s = baseline_negative_examples(
        tiny_lake, Mate(tiny_lake), examples, negatives, k=10
    )
    # both must drop every table containing a negative tuple
    from repro.core.seekers import MC
    neg_tables = set(MC(negatives, k=1000).run(tiny_index).tables)
    assert not (set(res.result) & neg_tables)
    assert not (set(base) & neg_tables)


def test_negative_examples_theorem1(tiny_index, neg_workload):
    examples, negatives = neg_workload
    plan = build_negative_examples_plan(examples, negatives, k=1000)
    a = execute_plan(plan, tiny_index, optimize=True)
    b = execute_plan(plan, tiny_index, optimize=False)
    assert a.result == b.result


# --- imputation ---------------------------------------------------------

@pytest.fixture(scope="module")
def imp_workload(tiny_lake):
    tid = tiny_lake.meta["groups"][1][0]
    df = tiny_lake.tables[tid]
    examples = df.iloc[:5, [0, 1]].reset_index(drop=True)
    queries = list(df.iloc[5:, 0])
    return examples, queries, tid


def test_imputation_blend_finds_group(tiny_lake, tiny_index, imp_workload):
    examples, queries, tid = imp_workload
    plan = build_imputation_plan(examples, queries, k=10)
    res = execute_plan(plan, tiny_index, optimize=True)
    assert tid in res.result
    assert res.rewrites.get("examples") == "IN"  # Example 2: MC rewritten


def test_imputation_baseline_agrees(tiny_lake, tiny_index, imp_workload):
    examples, queries, tid = imp_workload
    base, _s = baseline_imputation(Mate(tiny_lake), Josie(tiny_lake), examples, queries, k=10)
    assert tid in base


# --- feature discovery --------------------------------------------------

@pytest.fixture(scope="module")
def feat_workload(c_lake):
    q = [q for q in c_lake.meta["corr_queries"] if q["key_kind"] == "cat"][0]
    keys = q["keys"]
    target = [q["target"][k] for k in keys]
    g = np.random.default_rng(5)
    feats = [list(g.normal(0, 1, len(keys)))]
    key_query = pd.DataFrame(
        {"join_key": keys[:6], "region": [region_of(k) for k in keys[:6]]}
    )
    return q, keys, target, feats, key_query


def test_feature_discovery_blend(c_lake, c_index, feat_workload):
    q, keys, target, feats, key_query = feat_workload
    plan = build_feature_discovery_plan(keys, target, feats, key_query, k=10)
    res = execute_plan(plan, c_index, optimize=True)
    # result tables must be correlation candidates joinable on the key
    assert set(res.result) <= set(q["candidates"])
    assert res.result, "no features discovered"


def test_feature_discovery_filters_collinear(c_lake, c_index, feat_workload):
    """A feature identical to the target makes every target-correlated
    table collinear — the Difference chain must drop the strongest one."""
    q, keys, target, _feats, key_query = feat_workload
    plan = build_feature_discovery_plan(keys, target, [list(target)], key_query, k=10)
    res = execute_plan(plan, c_index, optimize=True)
    from repro.lake import exact_topk
    strongest = exact_topk(c_lake, q, k=1)[0]
    assert strongest not in res.result


def test_feature_discovery_baseline_runs(c_lake, feat_workload):
    q, keys, target, feats, key_query = feat_workload
    out, _s = baseline_feature_discovery(
        QcrSketch(c_lake, h=64), Mate(c_lake), keys, target, feats, key_query, k=10
    )
    assert set(out) <= set(c_lake.tables)


# --- multi objective ----------------------------------------------------

def test_multi_objective_blend(u_lake, u_index):
    qtid = u_lake.meta["queries"][0]
    examples = u_lake.tables[qtid]
    kws = [str(examples.iloc[0, 0])]
    plan = build_multi_objective_plan(kws, examples, ["k"], [1.0], k=5)
    res = execute_plan(plan, u_index, optimize=True)
    gt = u_lake.meta["gt"][qtid]
    assert set(res.result) & (gt | {qtid})


def test_multi_objective_baseline(u_lake):
    qtid = u_lake.meta["queries"][0]
    kws = [str(u_lake.tables[qtid].iloc[0, 0])]
    out, _s = baseline_multi_objective(
        Josie(u_lake), Starmie(u_lake), QcrSketch(u_lake, h=32),
        kws, qtid, ["k"], [1.0], k=5,
    )
    assert out


# --- union plan ---------------------------------------------------------

def test_union_plan_retrieves_gt(u_lake, u_index):
    qtid = u_lake.meta["queries"][0]
    plan = build_union_plan(u_lake.tables[qtid], k=10, k_sc=50)
    res = execute_plan(plan, u_index, optimize=True)
    ranked = [t for t in res.result if t != qtid]
    gt = u_lake.meta["gt"][qtid]
    assert len(set(ranked[:5]) & gt) >= 2


def test_union_plan_pushed_down(u_lake, u_index):
    qtid = u_lake.meta["queries"][1]
    plan = build_union_plan(u_lake.tables[qtid], k=10, k_sc=50)
    res = execute_plan(plan, u_index, optimize=True)
    assert res.rewrites.get("counter") == "COUNT-pushdown"
    assert len(res.sqls) == 1  # single in-DB statement


# --- LOC metric ---------------------------------------------------------

def test_blend_plans_are_concise():
    """The Table III LOC claim: plans are single-digit, baselines 3-10x."""
    assert loc(build_negative_examples_plan) <= 8
    assert loc(build_imputation_plan) <= 8
    assert loc(build_feature_discovery_plan) <= 12
    assert loc(build_multi_objective_plan) <= 10


def test_baseline_loc_larger():
    for plan_fn, base_fn in [
        (build_negative_examples_plan, baseline_negative_examples),
        (build_imputation_plan, baseline_imputation),
        (build_feature_discovery_plan, baseline_feature_discovery),
        (build_multi_objective_plan, baseline_multi_objective),
    ]:
        assert loc(base_fn) > loc(plan_fn)


def test_loc_ignores_comments_and_docstrings():
    def demo():
        """Docstring
        spanning lines."""
        # comment
        x = 1
        return x

    assert loc(demo) == 2
