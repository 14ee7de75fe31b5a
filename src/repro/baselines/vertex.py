"""Vertex++ — supervised wrapper induction baseline (§5.2).

The Vertex algorithm [17] learns XPath extraction rules from *manual*
annotations on a handful of pages per site. We simulate the manual
annotations with the generator's gold node labels on ``k`` training
pages (the paper used two pages per site, annotated by a co-author),
then induce generalised XPath rules: gold paths for one predicate that
share a tag sequence but differ at some indices generalise to a
wildcard pattern at the varying positions (robust to value lists and
index shifts seen in training); each remaining path stays an exact rule.

The "++" richer feature set is a *context check*: each rule remembers
the label-like strings seen adjacent to its training nodes (siblings
and uncles — e.g. ``"Height:"``), and at extraction a wildcard match
only fires when one of those strings is adjacent again. This is what
keeps wildcarded row indices from colliding across infobox rows.

Wrappers remain brittle by construction — a section ordering the
trainer never saw produces wrong or missing extractions — which is
exactly the behaviour the paper contrasts CERES against.
"""
from __future__ import annotations

from dataclasses import dataclass, field

import pandas as pd
from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.core.negatives import list_patterns, matches_pattern
from repro.dom.tree import xpath_tokens
from repro.kb.schema import NAME_PREDICATES

_CTX_LEN = 30


@dataclass
class VertexRules:
    """Induced wrapper: per (grp, predicate) patterns + context strings."""

    patterns: dict = field(default_factory=dict)  # (grp, pred) -> [pattern]
    contexts: dict = field(default_factory=dict)  # (grp, pred) -> set[str]
    name_pred: dict = field(default_factory=dict)  # grp -> name predicate


def _parent(xpath: str) -> str:
    return xpath.rsplit("/", 1)[0]


def _context_strings(page_nodes: pd.DataFrame, xpath: str) -> set:
    """Label-like strings adjacent to a node.

    Texts whose parent is the node's parent, grandparent, or
    great-grandparent — covering infobox row labels (sibling spans) and
    list headings (an ``h2`` beside the ``ul`` holding the node's
    ``li``).
    """
    anchors = {_parent(xpath)}
    cur = xpath
    for _ in range(2):
        cur = _parent(cur)
        if cur.count("/") > 1:
            anchors.add(_parent(cur))
    out = set()
    for rec in page_nodes.itertuples(index=False):
        if rec.xpath == xpath:
            continue
        if _parent(rec.xpath) in anchors:
            out.add(str(rec.text).strip()[:_CTX_LEN])
    return out


def _patterns_for(paths: list) -> list:
    """Generalised + exact patterns covering the training paths."""
    out = list_patterns(paths)  # wildcards for multi-example tag groups
    covered = [p for p in paths if any(matches_pattern(p, pat) for pat in out)]
    for p in paths:
        if p not in covered:
            out.append(tuple(xpath_tokens(p)))
    return out


def learn_rules(train_gold: pd.DataFrame, train_nodes: pd.DataFrame) -> VertexRules:
    """Induce rules from gold node labels on the training pages.

    ``train_gold`` columns: grp, page_id, xpath, predicate.
    ``train_nodes`` columns: page_id, xpath, text (all text fields of
    the training pages, for the context check).
    """
    rules = VertexRules()
    by_page = dict(tuple(train_nodes.groupby("page_id")))
    for (grp, pred), sub in train_gold.groupby(["grp", "predicate"]):
        rules.patterns[(grp, pred)] = _patterns_for(sorted(sub["xpath"].unique()))
        ctx: set = set()
        for rec in sub.itertuples(index=False):
            page_nodes = by_page.get(rec.page_id)
            if page_nodes is not None:
                ctx |= _context_strings(page_nodes, rec.xpath)
        rules.contexts[(grp, pred)] = ctx
        if pred in NAME_PREDICATES:
            rules.name_pred[grp] = pred
    return rules


def extract(nodes: DataFrame, rules: VertexRules) -> pd.DataFrame:
    """Apply the wrapper to all nodes; returns extraction rows.

    Output matches the CERES extraction schema (confidence = 1.0).
    Subject resolution mirrors §4.3: the node matched by the name
    predicate's rule supplies the subject for the page's other
    extractions; pages where the name rule fires ambiguously yield no
    extractions.
    """
    grps = {g for g, _ in rules.patterns}
    pdf = (
        nodes.where(F.col("grp").isin(list(grps)))
        .select("grp", "site", "page_id", "xpath", "text")
        .toPandas()
    )
    rows = []
    for (grp, page_id), sub in pdf.groupby(["grp", "page_id"]):
        name_pred = rules.name_pred.get(grp)
        site = sub["site"].iloc[0]
        matched = []
        for rec in sub.itertuples(index=False):
            preds = set()
            for (g, pred), pats in rules.patterns.items():
                if g != grp or not any(matches_pattern(rec.xpath, pat) for pat in pats):
                    continue
                ctx = rules.contexts.get((g, pred), set())
                if ctx and not (_context_strings(sub, rec.xpath) & ctx):
                    continue
                preds.add(pred)
            if preds:
                matched.append((rec.xpath, rec.text, preds))
        subjects = [t for _, t, preds in matched if name_pred in preds]
        if len(set(subjects)) != 1:
            continue
        subject = subjects[0]
        for xpath, text, preds in matched:
            for p in preds:
                if p == name_pred:
                    rows.append((grp, site, page_id, subject, "_name", subject, 1.0))
                else:
                    rows.append((grp, site, page_id, subject, p, text, 1.0))
    return pd.DataFrame(
        rows,
        columns=["grp", "site", "page_id", "subject", "predicate", "object", "confidence"],
    ).drop_duplicates()
