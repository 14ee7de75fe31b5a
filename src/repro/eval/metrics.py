"""Precision/recall/F1 metrics for extractions, annotations and topics.

Two extraction metrics mirror the paper:

* **all-mentions** (Table 4/5): every extracted triple is scored
  against the page-asserted gold triples;
* **page hits** (Table 3, following Hao et al. [19]): one prediction
  per (page, predicate) — the highest-confidence one — credited if it
  matches any gold object for that page and predicate.

Gold comes from the generator (the stand-in for SWDE ground truth /
the Vertex++-built IMDb gold / manual CommonCrawl checks).
"""
from __future__ import annotations

import pandas as pd

from repro.core.annotate import NAME_LABEL
from repro.core.matching import norm_text
from repro.kb.schema import NAME_PREDICATES


def _f1(p: float, r: float) -> float:
    return 0.0 if p + r == 0 else 2 * p * r / (p + r)


def _site_name_preds(gold: pd.DataFrame) -> dict:
    """site -> its name-like predicate ("title" or "name")."""
    rows = gold[gold["predicate"].isin(NAME_PREDICATES)]
    return dict(rows.groupby("site")["predicate"].first())


def _prep_gold(gold: pd.DataFrame) -> pd.DataFrame:
    g = gold.copy()
    g["object_norm"] = g["object"].map(norm_text)
    g["subject_norm"] = g["subject"].map(norm_text)
    return g


def _prep_extractions(ext: pd.DataFrame, name_preds: dict) -> pd.DataFrame:
    e = ext.copy()
    if e.empty:
        for c in ("object_norm", "subject_norm"):
            e[c] = pd.Series(dtype=str)
        return e
    e["object_norm"] = e["object"].map(norm_text)
    e["subject_norm"] = e["subject"].map(norm_text)
    e["predicate"] = [
        name_preds.get(site, p) if p == NAME_LABEL else p
        for site, p in zip(e["site"], e["predicate"])
    ]
    return e


def extraction_metrics(
    extractions: pd.DataFrame,
    gold: pd.DataFrame,
    *,
    eval_pages: set | None = None,
    require_subject: bool = True,
) -> pd.DataFrame:
    """All-mentions P/R/F1 per (site, predicate).

    A triple is correct iff its (page, predicate, normalised object)
    appears in gold — and, when ``require_subject``, its subject equals
    the page's gold topic name.
    """
    gold = _prep_gold(gold)
    if eval_pages is not None:
        gold = gold[gold["page_id"].isin(eval_pages)]
    name_preds = _site_name_preds(gold)
    ext = _prep_extractions(extractions, name_preds)
    if eval_pages is not None and not ext.empty:
        ext = ext[ext["page_id"].isin(eval_pages)]

    def key(df):
        k = list(zip(df["page_id"], df["predicate"], df["object_norm"]))
        if require_subject:
            k = [t + (s,) for t, s in zip(k, df["subject_norm"])]
        return k

    gold_keys = set(key(gold))
    ext = ext.drop_duplicates(subset=["page_id", "predicate", "object_norm"])
    ext_keys = key(ext) if not ext.empty else []
    ext["correct"] = [k in gold_keys for k in ext_keys]

    rows = []
    sites = sorted(set(gold["site"]) | set(ext["site"] if not ext.empty else []))
    for site in sites:
        g_site = gold[gold["site"] == site]
        e_site = ext[ext["site"] == site] if not ext.empty else ext
        preds = sorted(set(g_site["predicate"]) | set(e_site["predicate"] if not e_site.empty else []))
        for pred in preds:
            g = g_site[g_site["predicate"] == pred]
            e = e_site[e_site["predicate"] == pred] if not e_site.empty else e_site
            tp = int(e["correct"].sum()) if not e.empty else 0
            fp = len(e) - tp if not e.empty else 0
            matched = set(key(e[e["correct"]])) if not e.empty else set()
            fn = sum(1 for k in key(g) if k not in matched)
            p = tp / (tp + fp) if tp + fp else 0.0
            r = tp / (tp + fn) if tp + fn else 0.0
            rows.append((site, pred, tp, fp, fn, p, r, _f1(p, r)))
    return pd.DataFrame(
        rows, columns=["site", "predicate", "tp", "fp", "fn", "precision", "recall", "f1"]
    )


def page_hit_metrics(
    extractions: pd.DataFrame,
    gold: pd.DataFrame,
    *,
    eval_pages: set | None = None,
) -> pd.DataFrame:
    """Page-hit P/R/F1 per (site, predicate) — Hao et al.'s metric."""
    gold = _prep_gold(gold)
    if eval_pages is not None:
        gold = gold[gold["page_id"].isin(eval_pages)]
    name_preds = _site_name_preds(gold)
    ext = _prep_extractions(extractions, name_preds)
    if eval_pages is not None and not ext.empty:
        ext = ext[ext["page_id"].isin(eval_pages)]
    if not ext.empty:
        ext = (
            ext.sort_values("confidence", ascending=False)
            .groupby(["site", "page_id", "predicate"], as_index=False)
            .first()
        )

    gold_objs = gold.groupby(["site", "page_id", "predicate"])["object_norm"].agg(set)
    rows = []
    sites = sorted(set(gold["site"]) | (set(ext["site"]) if not ext.empty else set()))
    for site in sites:
        g_site = gold[gold["site"] == site]
        e_site = ext[ext["site"] == site] if not ext.empty else ext
        preds = sorted(set(g_site["predicate"]) | (set(e_site["predicate"]) if not e_site.empty else set()))
        for pred in preds:
            g_pages = {
                pid: objs
                for (s, pid, p), objs in gold_objs.items()
                if s == site and p == pred
            }
            e_rows = (
                e_site[e_site["predicate"] == pred] if not e_site.empty else e_site
            )
            tp = fp = 0
            hit_pages = set()
            if not e_rows.empty:
                for rec in e_rows.itertuples(index=False):
                    objs = g_pages.get(rec.page_id, set())
                    if rec.object_norm in objs:
                        tp += 1
                        hit_pages.add(rec.page_id)
                    else:
                        fp += 1
            fn = len(set(g_pages) - hit_pages)
            p = tp / (tp + fp) if tp + fp else 0.0
            r = tp / (tp + fn) if tp + fn else 0.0
            rows.append((site, pred, tp, fp, fn, p, r, _f1(p, r)))
    return pd.DataFrame(
        rows, columns=["site", "predicate", "tp", "fp", "fn", "precision", "recall", "f1"]
    )


def vertical_f1(site_metrics: pd.DataFrame) -> float:
    """Macro F1: per-site micro P/R → F1, averaged over sites."""
    out = []
    for site, sub in site_metrics.groupby("site"):
        tp, fp, fn = sub["tp"].sum(), sub["fp"].sum(), sub["fn"].sum()
        p = tp / (tp + fp) if tp + fp else 0.0
        r = tp / (tp + fn) if tp + fn else 0.0
        out.append(_f1(p, r))
    return float(pd.Series(out).mean()) if out else 0.0


def annotation_metrics(
    annotations: pd.DataFrame,
    gold_nodes: pd.DataFrame,
    gold_topics: pd.DataFrame,
    kb_triples: pd.DataFrame,
) -> pd.DataFrame:
    """Annotation accuracy per predicate (Table 6).

    Precision: fraction of annotations placed on a node that truly
    asserts that predicate. Recall (per the paper): fraction of
    page-asserted facts *present in the KB* that were annotated at a
    correct node.
    """
    gn = gold_nodes.copy()
    gn["object_norm"] = gn["object"].map(norm_text)
    gold_xp = set(zip(gn["page_id"], gn["xpath"], gn["predicate"]))
    name_xp = set(
        (pid, xp)
        for pid, xp, pred in gold_xp
        if pred in NAME_PREDICATES
    )

    ann = annotations.copy()
    correct = []
    for rec in ann.itertuples(index=False):
        if rec.label == NAME_LABEL:
            correct.append((rec.page_id, rec.xpath) in name_xp)
        else:
            correct.append((rec.page_id, rec.xpath, rec.label) in gold_xp)
    ann["correct"] = correct

    # Recallable facts: gold (page, pred, obj) whose topic-subject triple
    # exists in the KB.
    kb = kb_triples.copy()
    kb["subject_norm"] = kb["subject_name"].map(norm_text)
    kb["object_norm"] = kb["object"].map(norm_text)
    kb_keys = set(zip(kb["subject_norm"], kb["predicate"], kb["object_norm"]))
    topics = gold_topics[gold_topics["topic"].notna()]
    topic_by_page = dict(zip(topics["page_id"], topics["topic"].map(norm_text)))
    recallable = set()
    for rec in gn.itertuples(index=False):
        if rec.predicate in NAME_PREDICATES:
            continue
        subj = topic_by_page.get(rec.page_id)
        if subj and (subj, rec.predicate, rec.object_norm) in kb_keys:
            recallable.add((rec.page_id, rec.predicate, rec.object_norm))

    got = set()
    for rec in ann[ann["correct"]].itertuples(index=False):
        if rec.label != NAME_LABEL:
            got.add((rec.page_id, rec.label, rec.object_norm))

    rows = []
    preds = sorted(set(ann["label"]) - {NAME_LABEL})
    for pred in preds:
        sub = ann[ann["label"] == pred]
        tp = int(sub["correct"].sum())
        p = tp / len(sub) if len(sub) else 0.0
        rec_set = {k for k in recallable if k[1] == pred}
        hit = {k for k in got if k[1] == pred}
        r = len(hit & rec_set) / len(rec_set) if rec_set else 0.0
        rows.append((pred, len(sub), p, r, _f1(p, r)))
    return pd.DataFrame(
        rows, columns=["predicate", "n_annotations", "precision", "recall", "f1"]
    )


def topic_metrics(
    topics: pd.DataFrame,
    gold_topics: pd.DataFrame,
    kb_entities: pd.DataFrame,
    *,
    domain_of: dict | None = None,
) -> pd.DataFrame:
    """Topic-identification P/R/F1 (Table 7), optionally per domain."""
    gold = gold_topics[gold_topics["topic"].notna()].copy()
    gold["topic_norm_gold"] = gold["topic"].map(norm_text)
    in_kb = set(kb_entities["entity_id"])
    gold["in_kb"] = gold["entity_id"].isin(in_kb)
    merged = gold.merge(
        topics[["page_id", "topic_norm"]], on="page_id", how="left"
    )
    merged["domain"] = (
        [domain_of.get(pid, "all") for pid in merged["page_id"]]
        if domain_of
        else "all"
    )
    rows = []
    for dom, sub in merged.groupby("domain"):
        assigned = sub[sub["topic_norm"].notna()]
        correct = int((assigned["topic_norm"] == assigned["topic_norm_gold"]).sum())
        universe = sub[sub["in_kb"]]
        p = correct / len(assigned) if len(assigned) else 0.0
        r = correct / len(universe) if len(universe) else 0.0
        rows.append((dom, len(assigned), len(universe), p, r, _f1(p, r)))
    return pd.DataFrame(
        rows, columns=["domain", "n_assigned", "n_universe", "precision", "recall", "f1"]
    )
