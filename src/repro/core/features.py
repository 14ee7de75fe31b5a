"""Node featurisation (§4.2): structural + node-text features.

*Structural features* follow the Vertex feature set: for the node, its
ancestors, and siblings of those ancestors (±5), emit a tuple of
(attribute name, attribute value, ancestry level, sibling offset) over
the HTML attributes tag/class/id/itemprop/itemtype/property.

*Node text features*: strings that appear on a large fraction of the
site's pages (field labels like "Director:") generate a feature when
found near the node — (string, ancestry level, sibling offset).

Features are hashed to a fixed-dimension index space so per-site models
share one vector width. Featurisation parses each page once inside
``mapInPandas`` and emits rows for every text field.
"""
from __future__ import annotations

import hashlib
from typing import Iterator

import pandas as pd
from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.dom.tree import FEATURE_ATTRS

HASH_DIM = 1 << 16
_SIB_WIDTH = 5
_TEXT_LEVELS = 3
_TEXT_SIB_WIDTH = 3
_MAX_TEXT = 30

FEATURES_SCHEMA = (
    "grp string, site string, page_id string, xpath string, text string, "
    "features array<int>"
)


def hash_feature(feature: str, dim: int = HASH_DIM) -> int:
    """Stable 32-bit hash of a feature string, modulo the vector width."""
    digest = hashlib.md5(feature.encode("utf-8")).digest()
    return int.from_bytes(digest[:4], "little") % dim


def _node_attr_features(index, xpath: str, level: int, sib: int, out: list) -> None:
    node = index.node(xpath)
    out.append(f"s|tag|{node.tag}|{level}|{sib}")
    for attr in FEATURE_ATTRS:
        val = node.attrs.get(attr)
        if val:
            out.append(f"s|{attr}|{val}|{level}|{sib}")


def node_features(index, xpath: str, frequent: set) -> list:
    """All feature strings for one text node."""
    out: list[str] = []
    _node_attr_features(index, xpath, 0, 0, out)
    for off, sib in index.siblings(xpath, _SIB_WIDTH):
        _node_attr_features(index, sib, 0, off, out)
    ancestors = index.ancestors(xpath)
    for level, anc in enumerate(ancestors, start=1):
        _node_attr_features(index, anc, level, 0, out)
        for off, sib in index.siblings(anc, _SIB_WIDTH):
            _node_attr_features(index, sib, level, off, out)
    if frequent:
        # Nearby frequent strings: the node's ancestors' neighbourhoods.
        near = [(0, 0, xpath)]
        for off, sib in index.siblings(xpath, _TEXT_SIB_WIDTH):
            near.append((0, off, sib))
        for level, anc in enumerate(ancestors[:_TEXT_LEVELS], start=1):
            for off, sib in index.siblings(anc, _TEXT_SIB_WIDTH):
                near.append((level, off, sib))
        for level, off, path in near:
            if path == xpath:
                continue
            node = index.node(path)
            texts = [node.text] + [c.text for c in node.children]
            for t in texts:
                t = (t or "").strip()[:_MAX_TEXT]
                if t and t in frequent:
                    out.append(f"t|{t}|{level}|{off}")
    return out


def frequent_strings(nodes: DataFrame, *, min_frac: float = 0.3, max_len: int = 30) -> dict:
    """Per-group set of strings appearing on ≥ min_frac of pages.

    Collected to the driver (a handful of label strings per site) and
    broadcast into the featuriser closure.
    """
    trimmed = nodes.withColumn("t", F.substring(F.trim("text"), 1, max_len))
    page_counts = nodes.groupBy("grp").agg(
        F.countDistinct("page_id").alias("n_pages")
    )
    freq = (
        trimmed.groupBy("grp", "t")
        .agg(F.countDistinct("page_id").alias("n"))
        .join(page_counts, on="grp")
        .where(F.col("n") >= F.col("n_pages") * min_frac)
        .select("grp", "t")
        .toPandas()
    )
    out: dict[str, set] = {}
    for r in freq.itertuples(index=False):
        out.setdefault(r.grp, set()).add(r.t)
    return out


def featurize_pages(
    pages: DataFrame, frequent: dict, *, dim: int = HASH_DIM
) -> DataFrame:
    """Parse each page and emit hashed feature vectors for every text field."""

    def run(batches: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
        from repro.dom.html import parse_html
        from repro.dom.tree import PageIndex

        for pdf in batches:
            rows = []
            for rec in pdf.itertuples(index=False):
                index = PageIndex(parse_html(rec.html))
                freq = frequent.get(rec.grp, set())
                for xpath, text in index.text_fields():
                    feats = node_features(index, xpath, freq)
                    idx = sorted({hash_feature(f, dim) for f in feats})
                    rows.append((rec.grp, rec.site, rec.page_id, xpath, text, idx))
            yield pd.DataFrame(
                rows,
                columns=["grp", "site", "page_id", "xpath", "text", "features"],
            )

    return pages.mapInPandas(run, schema=FEATURES_SCHEMA)
