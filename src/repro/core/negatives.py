"""Negative ("OTHER") training examples (§4.1).

For each annotated page, sample ``r`` unlabeled text nodes per positive
annotation. Because annotations are incomplete, nodes that look like
*list siblings* of a positive are excluded: if several positives of one
label differ only at some XPath indices, any node matching that
wildcard pattern is likely an unannotated member of the same value list
(e.g. a cast member missing from the KB) and must not become a
negative.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame

from repro.dom.tree import xpath_tokens

OTHER_LABEL = "_other"

_NEG_SCHEMA = "grp string, page_id string, xpath string, label string, object_norm string"


def list_patterns(xpaths: list) -> list:
    """Wildcard patterns from positives that differ only at indices.

    Returns a list of tuples of (tag, idx-or-None) steps; ``None`` marks
    a wildcard index position.
    """
    groups: dict = {}
    for p in xpaths:
        toks = xpath_tokens(p)
        key = tuple(t for t, _ in toks)
        groups.setdefault(key, []).append(toks)
    patterns = []
    for key, members in groups.items():
        if len(members) < 2:
            continue
        pattern = []
        for pos in range(len(key)):
            indices = {m[pos][1] for m in members}
            pattern.append((key[pos], None if len(indices) > 1 else indices.pop()))
        patterns.append(tuple(pattern))
    return patterns


def matches_pattern(xpath: str, pattern: tuple) -> bool:
    toks = xpath_tokens(xpath)
    if len(toks) != len(pattern):
        return False
    for (tag, idx), (ptag, pidx) in zip(toks, pattern):
        if tag != ptag or (pidx is not None and idx != pidx):
            return False
    return True


def _sample_page(pdf: pd.DataFrame, r: int) -> pd.DataFrame:
    positives = pdf[pdf["label"].notna()]
    if positives.empty:
        return pd.DataFrame(columns=["grp", "page_id", "xpath", "label", "object_norm"])
    pos_paths = set(positives["xpath"])
    patterns = []
    for _, sub in positives.groupby("label"):
        patterns.extend(list_patterns(list(sub["xpath"].unique())))
    unlabeled = pdf[pdf["label"].isna()]
    eligible = [
        p
        for p in unlabeled["xpath"].unique()
        if p not in pos_paths
        and not any(matches_pattern(p, pat) for pat in patterns)
    ]
    n = min(len(eligible), r * len(positives))
    # zlib.crc32, not hash(): Python string hashing is salted per process.
    import zlib

    seed = zlib.crc32(str(pdf["page_id"].iloc[0]).encode("utf-8"))
    rng = np.random.default_rng(seed)
    chosen = sorted(rng.choice(np.array(sorted(eligible)), size=n, replace=False)) if n else []
    return pd.DataFrame(
        {
            "grp": pdf["grp"].iloc[0],
            "page_id": pdf["page_id"].iloc[0],
            "xpath": chosen,
            "label": OTHER_LABEL,
            "object_norm": "",
        }
    )


def sample_negatives(nodes: DataFrame, annotations: DataFrame, *, r: int = 3) -> DataFrame:
    """Negative examples for every annotated page (r per positive)."""
    ann = annotations.select("grp", "page_id", "xpath", "label")
    joined = nodes.select("grp", "page_id", "xpath").join(
        ann, on=["grp", "page_id", "xpath"], how="left"
    )
    annotated_pages = annotations.select("grp", "page_id").distinct()
    joined = joined.join(annotated_pages, on=["grp", "page_id"])
    return joined.groupBy("grp", "page_id").applyInPandas(
        lambda pdf: _sample_page(pdf, r), schema=_NEG_SCHEMA
    )
