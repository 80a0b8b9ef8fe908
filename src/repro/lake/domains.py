"""Deterministic vocabularies for synthetic lake columns.

Each *domain* is a named pool of string values (departments, cities,
people, products, codes) or a numeric generator. Columns generated from
the same domain are "semantically unionable" even when their concrete
value sets barely overlap — the property the Starmie simulation keys on
(DESIGN.md § Substitutions).
"""
from __future__ import annotations

import numpy as np

_SYLLA = ["ba", "re", "mo", "ti", "ka", "lu", "so", "ne", "vi", "da", "po", "zu"]


def _words(prefix: str, n: int, seed: int) -> list[str]:
    """``n`` pronounceable, unique, deterministic tokens."""
    g = np.random.default_rng(seed)
    out, seen = [], set()
    while len(out) < n:
        w = prefix + "_" + "".join(g.choice(_SYLLA, 3)) + str(g.integers(0, 100))
        if w not in seen:
            seen.add(w)
            out.append(w)
    return out


# name -> value pool. Sizes vary so value frequencies in the lake are
# heavy-tailed (small pools => values recur across many tables/rows, which
# is what makes posting lists fat and the cost-model frequency feature
# informative).
STRING_DOMAINS: dict[str, list[str]] = {
    "department": ["HR", "Marketing", "Finance", "IT", "R&D", "Sales",
                   "Legal", "Support", "Ops", "Design"],
    "city": _words("city", 40, 11),
    "person": _words("person", 400, 12),
    "product": _words("product", 120, 13),
    "company": _words("company", 60, 14),
    "country": _words("country", 25, 15),
    "code": [f"C{i:04d}" for i in range(300)],
    "status": ["open", "closed", "pending", "archived", "active", "stale"],
    "category": _words("cat", 30, 16),
    "project": _words("proj", 150, 17),
}

NUMERIC_DOMAINS = ["amount", "count", "score", "year", "size"]
ALL_DOMAINS = list(STRING_DOMAINS) + NUMERIC_DOMAINS


def sample_numeric(domain: str, n: int, g: np.random.Generator) -> np.ndarray:
    """Draw ``n`` values from a numeric domain."""
    if domain == "amount":
        return (g.random(n) * 10_000).round(2)
    if domain == "count":
        return g.integers(0, 500, n).astype(float)
    if domain == "score":
        return (g.random(n) * 100).round(1)
    if domain == "year":
        return g.integers(1990, 2026, n).astype(float)
    if domain == "size":
        return g.integers(1, 60, n).astype(float)
    raise KeyError(domain)


def sample_string(domain: str, n: int, g: np.random.Generator) -> list[str]:
    """Draw ``n`` values (with replacement, Zipf-ish skew) from a string
    domain pool so some values are far more frequent than others."""
    pool = STRING_DOMAINS[domain]
    ranks = np.arange(1, len(pool) + 1, dtype=float)
    w = 1.0 / np.sqrt(ranks)
    w /= w.sum()
    return [pool[i] for i in g.choice(len(pool), size=n, p=w)]
