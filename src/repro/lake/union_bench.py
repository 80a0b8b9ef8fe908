"""TUS/SANTOS-style union-search benchmark lakes (paper §VIII-F, Table VI).

The real TUS/SANTOS benchmarks build ground truth by splitting base tables
row-wise: segments of the same base are unionable. We reproduce exactly
that construction. A ``semantic_frac`` of the segments have their string
values *re-sampled* from the column's domain instead of copied from the
base rows — these segments are unionable by construction (same schema,
same domains) but have near-zero value overlap, which is the class of
pairs the paper says only Starmie's semantic embeddings can see ("some
unionable tables with high semantic relatedness significantly lack overlap
similarity", §VIII-F).
"""
from __future__ import annotations

import numpy as np
import pandas as pd

from .base import DataLake
from .domains import NUMERIC_DOMAINS, STRING_DOMAINS, sample_numeric, sample_string


def union_lake(
    *,
    n_base: int = 12,
    segments_per_base: int = 6,
    rows_per_segment: int = 30,
    n_cols: tuple[int, int] = (3, 5),
    semantic_frac: float = 0.25,
    n_distractors: int = 15,
    seed: int = 0,
) -> DataLake:
    """Build a union benchmark lake.

    ``meta`` keys:
      - ``gt``: query tid -> set of unionable tids (same base, self excluded),
      - ``queries``: list of query table ids (first segment of each base),
      - ``column_domains``: (tid, col index) -> domain name,
      - ``semantic``: set of tids whose values were re-sampled.
    """
    g = np.random.default_rng(seed)
    lake = DataLake(
        meta={"gt": {}, "queries": [], "column_domains": {}, "semantic": set(),
              "topics": {}}
    )
    base_members: dict[int, list[int]] = {}
    domain_pool = list(STRING_DOMAINS)

    for b in range(n_base):
        k = int(g.integers(n_cols[0], n_cols[1] + 1))
        # one numeric column, the rest strings; domains drawn with reuse
        # across bases so distinct bases can share domains (confusable pairs)
        sdoms = [domain_pool[int(g.integers(0, len(domain_pool)))] for _ in range(k - 1)]
        ndom = NUMERIC_DOMAINS[int(g.integers(0, len(NUMERIC_DOMAINS)))]
        n_rows = segments_per_base * rows_per_segment
        base_cols: dict[str, object] = {}
        for j, d in enumerate(sdoms):
            base_cols[f"c{j}_{d}"] = sample_string(d, n_rows, g)
        base_cols[f"c{k-1}_{ndom}"] = sample_numeric(ndom, n_rows, g)
        base = pd.DataFrame(base_cols)
        doms = sdoms + [ndom]

        members = []
        for s in range(segments_per_base):
            seg = base.iloc[s * rows_per_segment : (s + 1) * rows_per_segment].reset_index(drop=True)
            semantic = s > 0 and g.random() < semantic_frac
            if semantic:
                seg = seg.copy()
                for j, d in enumerate(sdoms):
                    seg.iloc[:, j] = sample_string(d, len(seg), g)
                seg.iloc[:, k - 1] = sample_numeric(ndom, len(seg), g)
            tid = lake.add(f"base{b}_seg{s}", seg)
            # the latent semantic unit: segments of one base share a topic
            # (what a contrastive model learns; consumed by the Starmie sim)
            lake.meta["topics"][tid] = f"union-base-{b}"
            if semantic:
                lake.meta["semantic"].add(tid)
            for j, d in enumerate(doms):
                lake.meta["column_domains"][(tid, j)] = d
            members.append(tid)
        base_members[b] = members

    for b, members in base_members.items():
        query = members[0]
        lake.meta["queries"].append(query)
        for tid in members:
            lake.meta["gt"][tid] = set(members) - {tid}

    for i in range(n_distractors):
        k = int(g.integers(n_cols[0], n_cols[1] + 1))
        sdoms = [domain_pool[int(g.integers(0, len(domain_pool)))] for _ in range(k - 1)]
        ndom = NUMERIC_DOMAINS[int(g.integers(0, len(NUMERIC_DOMAINS)))]
        cols: dict[str, object] = {}
        for j, d in enumerate(sdoms):
            cols[f"c{j}_{d}"] = sample_string(d, rows_per_segment, g)
        cols[f"c{k-1}_{ndom}"] = sample_numeric(ndom, rows_per_segment, g)
        tid = lake.add(f"distractor_{i}", pd.DataFrame(cols))
        for j, d in enumerate(sdoms + [ndom]):
            lake.meta["column_domains"][(tid, j)] = d
    return lake
