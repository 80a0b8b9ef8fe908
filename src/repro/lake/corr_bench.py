"""NYC-open-data-style correlation benchmark lakes (paper §VIII-G, Table VII).

Each *query* is a (join key column, numerical target) pair; the lake holds
candidate tables that join on the key and carry numerical columns with
*planted* correlation strengths (strong / weak / none, both signs).
Ground truth is the exact |Pearson| ranking, computed the same way the
paper computes it ("calculate the exact correlation between the query
target and each candidate").

Two properties reproduce the paper's comparison axes:

- ``key_kind``: queries draw their join key from categorical *or numeric*
  domains. The NYC (All) workload mixes both; NYC (Cat.) is categorical
  only. The QCR sketch baseline only supports categorical keys (its
  structural limitation the paper exploits in Table VII).
- candidate rows are written **sorted by join key**, so BLEND's vanilla
  convenience sampling (``RowId <= h``) sees a biased prefix of duplicated
  keys, while BLEND (rand) — built over shuffled RowIds — sees a random
  sample. This is exactly the paper's explanation for BLEND (rand) > BLEND.
"""
from __future__ import annotations

import numpy as np
import pandas as pd

from .base import DataLake
from .domains import STRING_DOMAINS


def region_of(key) -> str:
    """Deterministic second string attribute per join key — gives corr
    tables a 2-column composite key so the feature-discovery task can run
    its MC joinability check (paper §VIII-B4: "two joinable string
    columns")."""
    return f"grp_{sum(str(key).encode()) % 8}"


def _make_keys(kind: str, n: int, qid: int, g: np.random.Generator) -> list[str]:
    if kind == "cat":
        pool = STRING_DOMAINS["person"] + STRING_DOMAINS["project"]
        picks = g.choice(len(pool), size=n, replace=False)
        return [f"q{qid}_{pool[i]}" for i in picks]
    # numeric join keys, disjoint range per query
    base = 100_000 * (qid + 1)
    return [str(base + int(i)) for i in g.choice(10_000, size=n, replace=False)]


def corr_lake(
    *,
    n_cat_queries: int = 6,
    n_num_queries: int = 6,
    n_keys: int = 40,
    reps_per_key: int = 10,
    candidates_per_query: int = 12,
    n_distractors: int = 8,
    seed: int = 0,
) -> DataLake:
    """Build a correlation benchmark lake.

    ``meta["corr_queries"]`` is a list of dicts with:
      - ``keys``: the join-key values (normalized strings),
      - ``target``: dict key -> target value,
      - ``key_kind``: "cat" | "num",
      - ``candidates``: list of candidate table ids.

    Candidate tables have ``n_keys * reps_per_key`` rows (> h = 256 so the
    sampling clause binds) with columns: join key + 2 numeric columns whose
    correlation with the target is planted at a per-table strength in
    [0, 1), plus an always-independent numeric column.
    """
    g = np.random.default_rng(seed)
    lake = DataLake(meta={"corr_queries": [], "column_domains": {}})

    kinds = ["cat"] * n_cat_queries + ["num"] * n_num_queries
    for qid, kind in enumerate(kinds):
        keys = _make_keys(kind, n_keys, qid, g)
        target = {k: float(v) for k, v in zip(keys, g.normal(0, 1, n_keys))}
        cand_tids = []
        for c in range(candidates_per_query):
            sub = list(g.choice(keys, size=int(n_keys * 0.8), replace=False))
            # rows clustered by key, with the key blocks ordered by the
            # key's target value — an "unknown order" correlated with the
            # data (think date-sorted measurements). A RowId-prefix
            # convenience sample then sees only low-target keys, which is
            # exactly the non-representativeness the paper blames for
            # BLEND (rand) > BLEND (§VIII-G).
            sub.sort(key=lambda kk: target[kk])
            rows_keys = [k for k in sub for _ in range(reps_per_key)]
            t_vals = np.array([target[k] for k in rows_keys])
            # planted strength decays with candidate rank; sign alternates
            strength = max(0.0, 1.0 - c / candidates_per_query)
            sign = -1.0 if c % 2 else 1.0
            n = len(rows_keys)
            y1 = sign * strength * t_vals + (1 - strength) * g.normal(0, 1, n)
            y2 = 0.5 * strength * t_vals + (1 - 0.5 * strength) * g.normal(0, 1, n)
            # numeric join keys are stored with a numeric dtype, exactly as
            # real lake tables would hold them: the QCR baseline then skips
            # the column (categorical-only), while BLEND's normalization
            # makes them matchable (§VI iii)
            key_col = [int(k) for k in rows_keys] if kind == "num" else rows_keys
            df = pd.DataFrame(
                {
                    "join_key": key_col,
                    "region": [region_of(k) for k in rows_keys],
                    "metric_a": np.round(y1, 4),
                    "metric_b": np.round(y2, 4),
                    "noise_c": np.round(g.normal(0, 1, n), 4),
                }
            )
            tid = lake.add(f"corr_q{qid}_cand{c}", df)
            lake.meta["column_domains"][(tid, 0)] = "person" if kind == "cat" else "code"
            lake.meta["column_domains"][(tid, 1)] = "category"
            for j in range(2, 5):
                lake.meta["column_domains"][(tid, j)] = "score"
            cand_tids.append(tid)
        lake.meta["corr_queries"].append(
            {"keys": keys, "target": target, "key_kind": kind, "candidates": cand_tids}
        )

    for i in range(n_distractors):
        n = n_keys * reps_per_key // 2
        df = pd.DataFrame(
            {
                "label": [f"d{i}_{j % 37}" for j in range(n)],
                "value": np.round(g.normal(0, 1, n), 4),
            }
        )
        tid = lake.add(f"corr_distractor_{i}", df)
        lake.meta["column_domains"][(tid, 0)] = "category"
        lake.meta["column_domains"][(tid, 1)] = "score"
    return lake


def exact_topk(lake: DataLake, query: dict, k: int = 10) -> list[int]:
    """Ground-truth ranking: tables ordered by their best column's exact
    |Pearson| with the query target, joined on the key column."""
    from ..core.values import norm_cell

    target = query["target"]
    scores: list[tuple[float, int]] = []
    for tid in query["candidates"]:
        df = lake.tables[tid]
        t = df["join_key"].map(lambda v: target.get(norm_cell(v)))
        mask = t.notna()
        best = 0.0
        for col in df.columns[1:]:
            if not pd.api.types.is_numeric_dtype(df[col]):
                continue
            if mask.sum() >= 3:
                y = df.loc[mask, col].astype(float)
                tv = t[mask].astype(float)
                if y.std() > 0 and tv.std() > 0:
                    best = max(best, abs(float(np.corrcoef(tv, y)[0, 1])))
        scores.append((best, tid))
    scores.sort(key=lambda s: (-s[0], s[1]))
    return [tid for _, tid in scores[:k]]
