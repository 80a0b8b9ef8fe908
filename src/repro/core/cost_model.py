"""Learning-based cost estimation (paper §VII-B).

One linear-regression model per seeker type predicts relative runtime from
three features: cardinality of Q, number of columns in Q, and the average
frequency of Q's values in the lake (for MC: the *product* of per-column
average frequencies, because the MC SQL joins the per-column hit sets).
Training samples random Qs from the lake, times real executions, and fits
with ordinary least squares — "training occurs offline during deployment".
"""
from __future__ import annotations

import json
from dataclasses import dataclass, field

import numpy as np
import pandas as pd

from .index import BlendIndex
from .seekers import C, KW, MC, SC, Seeker, TYPE_RANK


def featurize(seeker: Seeker, index: BlendIndex) -> np.ndarray:
    """[1, card, n_cols, avg_freq, card*avg_freq] — the interaction term
    captures that runtime scales with the number of index hits."""
    card = float(seeker.input_cardinality())
    ncols = float(seeker.n_columns())
    freq = float(seeker.avg_frequency(index))
    return np.array([1.0, card, ncols, freq, card * freq])


@dataclass
class CostModel:
    """Per-seeker-type OLS runtime model with a frequency-based fallback
    for types never trained."""

    coef: dict[str, list[float]] = field(default_factory=dict)

    def predict(self, seeker: Seeker, index: BlendIndex) -> float:
        x = featurize(seeker, index)
        w = self.coef.get(seeker.type_name)
        if w is None:
            # heuristic fallback: expected index hits
            return x[1] * (1.0 + x[3])
        return float(np.dot(np.asarray(w), x))

    def fit(self, samples: list[tuple[str, np.ndarray, float]]) -> "CostModel":
        by_type: dict[str, list[tuple[np.ndarray, float]]] = {}
        for t, x, y in samples:
            by_type.setdefault(t, []).append((x, y))
        for t, rows in by_type.items():
            X = np.stack([x for x, _ in rows])
            y = np.array([s for _, s in rows])
            w, *_ = np.linalg.lstsq(X, y, rcond=None)
            self.coef[t] = [float(v) for v in w]
        return self

    def save(self, path: str) -> None:
        with open(path, "w") as f:
            json.dump(self.coef, f, indent=2)

    @classmethod
    def load(cls, path: str) -> "CostModel":
        with open(path) as f:
            return cls(coef=json.load(f))


# --- random training-query sampling (§VII-B: "randomly sample 1000 input
# Qs from the ... data lake") -- scaled down to laptop size ---------------

def sample_sc_query(index: BlendIndex, g: np.random.Generator, k: int = 10) -> SC:
    tids = list(index.lake.tables)
    df = index.lake.tables[tids[g.integers(0, len(tids))]]
    col = df.columns[g.integers(0, len(df.columns))]
    m = int(g.integers(4, min(61, max(5, len(df)))))
    vals = df[col].sample(n=min(m, len(df)), random_state=int(g.integers(0, 2**31)))
    return SC(list(vals), k=k)


def sample_kw_query(index: BlendIndex, g: np.random.Generator, k: int = 10) -> KW:
    pool = index.value_freq.index
    m = int(g.integers(1, 9))
    return KW([pool[i] for i in g.integers(0, len(pool), m)], k=k)


def sample_mc_query(index: BlendIndex, g: np.random.Generator, k: int = 10) -> MC:
    tids = [t for t, df in index.lake.tables.items() if len(df.columns) >= 2]
    df = index.lake.tables[tids[g.integers(0, len(tids))]]
    cols = list(g.choice(len(df.columns), size=2, replace=False))
    m = int(g.integers(4, 21))
    sub = df.iloc[:, cols].dropna().sample(
        n=min(m, len(df.dropna())), random_state=int(g.integers(0, 2**31))
    )
    return MC(sub.reset_index(drop=True), k=k)


def sample_c_query(index: BlendIndex, g: np.random.Generator, k: int = 10, h: int = 256) -> C:
    cands = []
    for t, df in index.lake.tables.items():
        nums = [c for c in df.columns if pd.api.types.is_numeric_dtype(df[c])]
        if nums and len(df.columns) >= 2:
            cands.append((t, nums))
    t, nums = cands[g.integers(0, len(cands))]
    df = index.lake.tables[t]
    num = nums[g.integers(0, len(nums))]
    others = [c for c in df.columns if c != num]
    key = others[g.integers(0, len(others))]
    m = int(g.integers(8, min(81, max(9, len(df)))))
    sub = df[[key, num]].dropna().head(m)
    return C(list(sub[key]), list(sub[num]), k=k, h=h)


_SAMPLERS = {"SC": sample_sc_query, "KW": sample_kw_query,
             "MC": sample_mc_query, "C": sample_c_query}


def train_cost_model(
    index: BlendIndex,
    *,
    n_per_type: int = 20,
    seed: int = 0,
    types: tuple[str, ...] = ("SC", "KW", "MC", "C"),
) -> CostModel:
    """Offline training: sample random Qs per type, execute them, fit OLS."""
    g = np.random.default_rng(seed)
    samples = []
    for t in types:
        for _ in range(n_per_type):
            seeker = _SAMPLERS[t](index, g)
            res = seeker.run(index)
            samples.append((t, featurize(seeker, index), res.seconds))
    return CostModel().fit(samples)


def rank_seekers(
    named: list[tuple[str, Seeker]],
    index: BlendIndex,
    cost_model: CostModel | None,
) -> list[tuple[str, Seeker]]:
    """Two-step ranking (§VII-B): rule-based by type (Rules 1–3: KW first,
    MC last, SC before C), then the learned cost model within a type."""
    cm = cost_model or CostModel()
    return sorted(
        named,
        key=lambda ns: (TYPE_RANK[ns[1].type_name], cm.predict(ns[1], index), ns[0]),
    )
