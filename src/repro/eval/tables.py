"""Harnesses that regenerate each evaluation table of the paper.

Experiments are factored so multi-table experiments run once:

* ``swde_experiment``    → Tables 1, 3, 4
* ``imdb_experiment``    → Tables 2, 5, 6, 7
* ``commoncrawl_experiment`` → Tables 8, 9

Each ``tableN`` function returns a pandas DataFrame whose rows place
our measured numbers next to the paper's (columns prefixed ``paper_``).
Scale parameters default to bench scale; tests pass smaller ones.
"""
from __future__ import annotations

from dataclasses import dataclass, field

import pandas as pd
from pyspark.sql import SparkSession
from pyspark.sql import functions as F

from repro.baselines import ds_baseline, page_cluster, vertex
from repro.core.matching import kb_to_spark
from repro.core.pipeline import CeresConfig, CeresResult, run_ceres, run_ceres_multi
from repro.core.features import featurize_pages, frequent_strings
from repro.dom.dataframe import nodes_df, pages_to_df
from repro.eval import paper
from repro.eval.metrics import (
    annotation_metrics,
    extraction_metrics,
    page_hit_metrics,
    topic_metrics,
    vertical_f1,
)
from repro.kb.schema import ONTOLOGIES
from repro.webgen.corpora import (
    CCRAWL_SITES,
    SWDE_PREDICATES,
    Corpus,
    commoncrawl_corpus,
    imdb_corpus,
    swde_corpus,
)

SWDE_VERTICALS = ("movie", "nbaplayer", "university", "book")


def _split(corpus: Corpus) -> tuple[set, set]:
    """Deterministic half/half annotate-train vs evaluate split."""
    ids = sorted(p["page_id"] for p in corpus.pages)
    return set(ids[::2]), set(ids[1::2])


def _prepare(spark: SparkSession, corpus: Corpus):
    """pages_df/nodes/features with grp=site, for the baselines."""
    pages_df = pages_to_df(spark, corpus.pages).withColumn("grp", F.col("site")).cache()
    nodes = (
        nodes_df(pages_df.drop("grp"))
        .join(pages_df.select("page_id", "grp"), on="page_id")
        .select("grp", "vertical", "site", "page_id", "xpath", "text")
        .cache()
    )
    kb_df = kb_to_spark(spark, corpus.kb).cache()
    freq = frequent_strings(nodes)
    features = featurize_pages(pages_df, freq).cache()
    return pages_df, nodes, kb_df, features


# ------------------------------------------------------------------ SWDE


@dataclass
class SwdeRun:
    vertical: str
    corpus: Corpus
    train: set
    eval_pages: set
    extractions: dict = field(default_factory=dict)  # system -> pdf | None (OOM)
    ceres: dict = field(default_factory=dict)  # mode -> CeresResult


def run_swde_vertical(
    spark: SparkSession,
    vertical: str,
    *,
    n_sites: int = 4,
    pages_per_site: int = 30,
    seed: int = 0,
    vertex_train_pages: int = 3,
    baseline_pair_budget: int = 200_000,
    config: CeresConfig = CeresConfig(),
    systems: tuple = ("vertex", "baseline", "topic", "full"),
) -> SwdeRun:
    """All four implementations on one synthetic SWDE vertical."""
    corpus = swde_corpus(
        vertical, n_sites=n_sites, pages_per_site=pages_per_site, seed=seed
    )
    train, eval_pages = _split(corpus)
    run = SwdeRun(vertical, corpus, train, eval_pages)

    if "vertex" in systems:
        # Manual annotations: gold node labels on the first k train pages
        # of each site (the paper's co-author-crafted annotations).
        gold = corpus.gold_nodes()
        gold = gold[gold["page_id"].isin(train)]
        picks = (
            gold[["site", "page_id"]]
            .drop_duplicates()
            .sort_values(["site", "page_id"])
            .groupby("site")
            .head(vertex_train_pages)
        )
        train_gold = gold.merge(picks, on=["site", "page_id"])
        train_gold = train_gold.rename(columns={"site": "grp"})[
            ["grp", "page_id", "xpath", "predicate"]
        ]
        pages_df, nodes, kb_df, features = _prepare(spark, corpus)
        train_nodes_pdf = (
            nodes.where(F.col("page_id").isin(list(set(train_gold["page_id"]))))
            .select("page_id", "xpath", "text")
            .toPandas()
        )
        rules = vertex.learn_rules(train_gold, train_nodes_pdf)
        ev_nodes = nodes.where(F.col("page_id").isin(list(eval_pages)))
        run.extractions["vertex"] = vertex.extract(ev_nodes, rules)
    else:
        pages_df = nodes = kb_df = features = None

    if "baseline" in systems:
        if pages_df is None:
            pages_df, nodes, kb_df, features = _prepare(spark, corpus)
        try:
            run.extractions["baseline"] = ds_baseline.run_baseline(
                spark,
                nodes,
                features,
                kb_df,
                train_pages=train,
                eval_pages=eval_pages,
                config=ds_baseline.BaselineConfig(pair_budget=baseline_pair_budget),
            )
        except ds_baseline.PairBudgetExceeded:
            run.extractions["baseline"] = None  # Table 3's NA (OOM)

    modes = tuple(m for m in ("topic", "full") if m in systems)
    if modes:
        results = run_ceres_multi(
            spark,
            corpus.pages,
            corpus.kb,
            modes=modes,
            config=config,
            train_pages=train,
            eval_pages=eval_pages,
        )
        for mode, res in results.items():
            run.ceres[mode] = res
            run.extractions[mode] = res.extractions
    return run


def swde_experiment(spark: SparkSession, **kwargs) -> dict:
    """Run all verticals; kwargs forwarded to ``run_swde_vertical``."""
    verticals = kwargs.pop("verticals", SWDE_VERTICALS)
    return {v: run_swde_vertical(spark, v, **kwargs) for v in verticals}


def table1(runs: dict) -> pd.DataFrame:
    """Table 1 — dataset summary (ours vs paper)."""
    rows = []
    for vertical, run in runs.items():
        p = paper.TABLE1[vertical]
        rows.append(
            {
                "vertical": vertical,
                "n_sites": len({pg["site"] for pg in run.corpus.pages}),
                "n_pages": len(run.corpus.pages),
                "attributes": ", ".join(SWDE_PREDICATES[vertical]),
                "paper_n_sites": p["sites"],
                "paper_n_pages": p["pages"],
                "paper_attributes": ", ".join(p["attributes"]),
            }
        )
    return pd.DataFrame(rows)


_T3_SYSTEMS = {"vertex": "Vertex++", "baseline": "CERES-Baseline", "topic": "CERES-Topic", "full": "CERES-Full"}


def table3(runs: dict) -> pd.DataFrame:
    """Table 3 — page-hit F1 per vertical, ours + paper rows."""
    rows = []
    for paper_system, vals in paper.TABLE3.items():
        row = {"system": paper_system, "source": "paper", "manual": vals["manual"]}
        for v in SWDE_VERTICALS:
            row[f"paper_{v}"] = vals.get(v)
        rows.append(row)
    for key, name in _T3_SYSTEMS.items():
        row = {"system": name, "source": "ours", "manual": key == "vertex"}
        for v, run in runs.items():
            ext = run.extractions.get(key)
            if ext is None:
                row[v] = None  # OOM sentinel (paper's NA)
                continue
            official = set(SWDE_PREDICATES[v])
            gold = run.corpus.gold_triples()
            gold = gold[gold["predicate"].isin(official)]
            if not ext.empty:
                ext = ext[ext["predicate"].isin(official | {"_name"})]
            m = page_hit_metrics(ext, gold, eval_pages=run.eval_pages)
            row[v] = round(vertical_f1(m), 3)
        rows.append(row)
    return pd.DataFrame(rows)


def table4(runs: dict) -> pd.DataFrame:
    """Table 4 — all-mentions P/R/F1 per predicate, Vertex++ vs CERES-Full."""
    rows = []
    for vertical, run in runs.items():
        official = set(SWDE_PREDICATES[vertical])
        gold = run.corpus.gold_triples()
        gold = gold[gold["predicate"].isin(official)]
        per_system = {}
        for key in ("vertex", "full"):
            ext = run.extractions.get(key)
            if ext is None:
                continue
            if not ext.empty:
                ext = ext[ext["predicate"].isin(official | {"_name"})]
            m = extraction_metrics(ext, gold, eval_pages=run.eval_pages)
            agg = (
                m.groupby("predicate")[["tp", "fp", "fn"]].sum().reset_index()
            )
            agg["precision"] = agg["tp"] / (agg["tp"] + agg["fp"]).clip(lower=1)
            agg["recall"] = agg["tp"] / (agg["tp"] + agg["fn"]).clip(lower=1)
            agg["f1"] = (
                2 * agg["precision"] * agg["recall"]
                / (agg["precision"] + agg["recall"]).replace(0, 1)
            )
            per_system[key] = agg.set_index("predicate")
        for pred in SWDE_PREDICATES[vertical]:
            paper_row = paper.TABLE4.get((vertical, pred), (None,) * 6)
            row = {"vertical": vertical, "predicate": pred}
            for key, off in (("vertex", 0), ("full", 3)):
                agg = per_system.get(key)
                if agg is not None and pred in agg.index:
                    row[f"{key}_p"] = round(float(agg.loc[pred, "precision"]), 3)
                    row[f"{key}_r"] = round(float(agg.loc[pred, "recall"]), 3)
                    row[f"{key}_f1"] = round(float(agg.loc[pred, "f1"]), 3)
                else:
                    row[f"{key}_p"] = row[f"{key}_r"] = row[f"{key}_f1"] = None
                row[f"paper_{key}_p"] = paper_row[off]
                row[f"paper_{key}_r"] = paper_row[off + 1]
                row[f"paper_{key}_f1"] = paper_row[off + 2]
            rows.append(row)
    return pd.DataFrame(rows)


# ------------------------------------------------------------------ IMDb


@dataclass
class ImdbRun:
    corpus: Corpus
    train: set
    eval_pages: set
    clusters: dict
    results: dict  # mode -> CeresResult
    domain_of: dict  # page_id -> "Person" | "Film/TV"


def imdb_experiment(
    spark: SparkSession,
    *,
    n_film_pages: int = 40,
    n_person_pages: int = 24,
    n_episode_pages: int = 12,
    seed: int = 0,
    # min_annotations=2 (paper: 3): synthetic person pages carry far
    # fewer annotatable facts than real IMDb pages (the KB's biased
    # coverage leaves ~2-4 matches/page), so the paper's threshold
    # would discard most of the training set at our scale.
    config: CeresConfig = CeresConfig(min_annotations=2),
) -> ImdbRun:
    corpus = imdb_corpus(
        n_film_pages=n_film_pages,
        n_person_pages=n_person_pages,
        n_episode_pages=n_episode_pages,
        seed=seed,
    )
    train, eval_pages = _split(corpus)
    pages_df = pages_to_df(spark, corpus.pages)
    clusters = page_cluster.cluster_pages(nodes_df(pages_df))
    results = run_ceres_multi(
        spark,
        corpus.pages,
        corpus.kb,
        modes=("topic", "full"),
        config=config,
        train_pages=train,
        eval_pages=eval_pages,
        clusters=clusters,
    )
    topics = corpus.topics()
    etype = {eid: e.type for eid, e in corpus.world.entities.items()}
    domain_of = {
        r.page_id: ("Person" if etype.get(r.entity_id) == "person" else "Film/TV")
        for r in topics.itertuples(index=False)
        if pd.notna(r.entity_id)
    }
    return ImdbRun(corpus, train, eval_pages, clusters, results, domain_of)


def table2(run: ImdbRun) -> pd.DataFrame:
    """Table 2 — seed-KB summary (ours vs paper)."""
    kb = run.corpus.kb
    counts = kb.entities.groupby("entity_type").size()
    preds = kb.triples.groupby("subject_type")["predicate"].nunique()
    rows = []
    for etype in ("person", "film", "tv_series", "tv_episode"):
        p = paper.TABLE2[etype]
        rows.append(
            {
                "entity_type": etype,
                "instances": int(counts.get(etype, 0)),
                "predicates": int(preds.get(etype, 0)),
                "paper_instances": p["instances"],
                "paper_predicates": p["predicates"],
            }
        )
    return pd.DataFrame(rows)


def _imdb_pred_table(run: ImdbRun, metric_fn) -> pd.DataFrame:
    out = {}
    for mode in ("topic", "full"):
        out[mode] = metric_fn(run.results[mode])
    return out


def table5(run: ImdbRun) -> pd.DataFrame:
    """Table 5 — extraction quality per predicate, Topic vs Full."""
    gold = run.corpus.gold_triples()
    gold["domain"] = gold["page_id"].map(run.domain_of)
    rows = []
    for domain in ("Person", "Film/TV"):
        g_dom = gold[gold["domain"] == domain].drop(columns=["domain"])
        dom_pages = {pid for pid, d in run.domain_of.items() if d == domain}
        stats = {}
        for mode in ("topic", "full"):
            ext = run.results[mode].extractions
            ext_dom = ext[ext["page_id"].isin(dom_pages)] if not ext.empty else ext
            m = extraction_metrics(ext_dom, g_dom, eval_pages=run.eval_pages)
            agg = m.groupby("predicate")[["tp", "fp", "fn"]].sum()
            stats[mode] = agg
        preds = sorted(
            set(stats["topic"].index) | set(stats["full"].index)
        )
        for pred, label in [(p, p) for p in preds] + [("ALL", "ALL")]:
            row = {"domain": domain, "predicate": label}
            for mode in ("topic", "full"):
                agg = stats[mode]
                if pred == "ALL":
                    tp, fp, fn = agg["tp"].sum(), agg["fp"].sum(), agg["fn"].sum()
                elif pred in agg.index:
                    tp, fp, fn = agg.loc[pred, ["tp", "fp", "fn"]]
                else:
                    tp = fp = fn = 0
                p = tp / (tp + fp) if tp + fp else 0.0
                r = tp / (tp + fn) if tp + fn else 0.0
                f1 = 0.0 if p + r == 0 else 2 * p * r / (p + r)
                row[f"{mode}_p"], row[f"{mode}_r"], row[f"{mode}_f1"] = (
                    round(p, 3), round(r, 3), round(f1, 3),
                )
            pk = (domain, "_name" if pred in ("title", "name") else pred)
            paper_row = paper.TABLE5.get(pk, (None,) * 6)
            row.update(
                paper_topic_p=paper_row[0], paper_topic_r=paper_row[1],
                paper_topic_f1=paper_row[2], paper_full_p=paper_row[3],
                paper_full_r=paper_row[4], paper_full_f1=paper_row[5],
            )
            rows.append(row)
    return pd.DataFrame(rows)


def table6(run: ImdbRun) -> pd.DataFrame:
    """Table 6 — annotation accuracy per predicate, Topic vs Full."""
    gold_nodes = run.corpus.gold_nodes()
    topics = run.corpus.topics()
    rows = []
    for domain in ("Person", "Film/TV"):
        dom_pages = {pid for pid, d in run.domain_of.items() if d == domain}
        gn = gold_nodes[gold_nodes["page_id"].isin(dom_pages)]
        tp_dom = topics[topics["page_id"].isin(dom_pages)]
        stats = {}
        for mode in ("topic", "full"):
            ann = run.results[mode].annotations
            ann_dom = ann[ann["page_id"].isin(dom_pages)]
            stats[mode] = annotation_metrics(
                ann_dom, gn, tp_dom, run.corpus.kb.triples
            ).set_index("predicate")
        preds = sorted(set(stats["topic"].index) | set(stats["full"].index))
        for pred in preds + ["ALL"]:
            row = {"domain": domain, "predicate": pred}
            for mode in ("topic", "full"):
                s = stats[mode]
                if pred == "ALL":
                    n = s["n_annotations"].sum()
                    p = (
                        (s["precision"] * s["n_annotations"]).sum() / n
                        if n
                        else 0.0
                    )
                    r = s["recall"].mean() if len(s) else 0.0
                elif pred in s.index:
                    p, r = s.loc[pred, "precision"], s.loc[pred, "recall"]
                else:
                    p = r = 0.0
                f1 = 0.0 if p + r == 0 else 2 * p * r / (p + r)
                row[f"{mode}_p"], row[f"{mode}_r"], row[f"{mode}_f1"] = (
                    round(p, 3), round(r, 3), round(f1, 3),
                )
            paper_row = paper.TABLE6.get((domain, pred), (None,) * 6)
            row.update(
                paper_topic_p=paper_row[0], paper_topic_r=paper_row[1],
                paper_topic_f1=paper_row[2], paper_full_p=paper_row[3],
                paper_full_r=paper_row[4], paper_full_f1=paper_row[5],
            )
            rows.append(row)
    return pd.DataFrame(rows)


def table7(run: ImdbRun) -> pd.DataFrame:
    """Table 7 — topic-identification accuracy per domain."""
    m = topic_metrics(
        run.results["full"].topics,
        run.corpus.topics(),
        run.corpus.kb.entities,
        domain_of=run.domain_of,
    )
    m = m.rename(columns={"precision": "p", "recall": "r"})
    rows = []
    for rec in m.itertuples(index=False):
        p = paper.TABLE7.get(rec.domain, {})
        rows.append(
            {
                "domain": rec.domain,
                "precision": round(rec.p, 3),
                "recall": round(rec.r, 3),
                "f1": round(rec.f1, 3),
                "paper_precision": p.get("precision"),
                "paper_recall": p.get("recall"),
                "paper_f1": p.get("f1"),
            }
        )
    return pd.DataFrame(rows)


# ----------------------------------------------------------- CommonCrawl


@dataclass
class CcrawlRun:
    corpus: Corpus
    clusters: dict
    result: CeresResult
    threshold: float


def commoncrawl_experiment(
    spark: SparkSession,
    *,
    pages_base: int = 24,
    seed: int = 0,
    threshold: float = 0.5,
    config: CeresConfig | None = None,
    sites: list | None = None,
) -> CcrawlRun:
    """Annotate + train + extract over every CommonCrawl-like site.

    ``sites`` (rows shaped like ``CCRAWL_SITES``) restricts to a subset
    — tests use a handful of sites; benchmarks run the full roster.
    """
    corpus = commoncrawl_corpus(pages_base=pages_base, seed=seed, sites=sites)
    pages_df = pages_to_df(spark, corpus.pages)
    clusters = page_cluster.cluster_pages(nodes_df(pages_df))
    cfg = config or CeresConfig(threshold=threshold)
    result = run_ceres(
        spark, corpus.pages, corpus.kb, config=cfg, clusters=clusters
    )
    return CcrawlRun(corpus, clusters, result, cfg.threshold)


def table8(run: CcrawlRun) -> pd.DataFrame:
    """Table 8 — per-site pages/annotations/extractions/precision."""
    gold = run.corpus.gold_triples()
    m = extraction_metrics(run.result.extractions, gold)
    prec = m.groupby("site")[["tp", "fp"]].sum()
    ann = run.result.annotations
    ann["site"] = [g.split("#")[0] for g in ann["grp"]]
    ext = run.result.extractions
    focus = {s.spec.name: getattr(s, "focus", "") for s in run.corpus.sites}
    rows = []
    for site_data in run.corpus.sites:
        site = site_data.spec.name
        n_pages = len(site_data.pages)
        a = ann[ann["site"] == site]
        n_ann_pages = a["page_id"].nunique()
        n_ann = len(a[a["label"] != "_name"])
        e = ext[ext["site"] == site] if not ext.empty else ext
        n_ext = len(e[e["predicate"] != "_name"]) if not e.empty else 0
        n_ext_pages = e["page_id"].nunique() if not e.empty else 0
        if site in prec.index and (prec.loc[site, "tp"] + prec.loc[site, "fp"]) > 0:
            precision = round(
                float(prec.loc[site, "tp"] / (prec.loc[site, "tp"] + prec.loc[site, "fp"])), 3
            )
        else:
            precision = None
        rows.append(
            {
                "site": site,
                "focus": focus.get(site, ""),
                "n_pages": n_pages,
                "n_annotated_pages": n_ann_pages,
                "n_annotations": n_ann,
                "n_extractions": n_ext,
                "extracted_to_annotated_pages": round(n_ext_pages / n_ann_pages, 2) if n_ann_pages else 0.0,
                "extraction_to_annotation": round(n_ext / n_ann, 2) if n_ann else 0.0,
                "precision": precision,
                "paper_precision": paper.TABLE8_PRECISION.get(site),
            }
        )
    total_tp, total_fp = m["tp"].sum(), m["fp"].sum()
    rows.append(
        {
            "site": "TOTAL",
            "focus": "-",
            "n_pages": sum(r["n_pages"] for r in rows),
            "n_annotated_pages": sum(r["n_annotated_pages"] for r in rows),
            "n_annotations": sum(r["n_annotations"] for r in rows),
            "n_extractions": sum(r["n_extractions"] for r in rows),
            "extracted_to_annotated_pages": None,
            "extraction_to_annotation": round(
                sum(r["n_extractions"] for r in rows)
                / max(1, sum(r["n_annotations"] for r in rows)),
                2,
            ),
            "precision": round(float(total_tp / (total_tp + total_fp)), 3)
            if total_tp + total_fp
            else None,
            "paper_precision": paper.TABLE8_TOTALS["precision"],
        }
    )
    return pd.DataFrame(rows)


def table9(run: CcrawlRun, *, top_k: int = 10) -> pd.DataFrame:
    """Table 9 — most-extracted predicates: annotations/extractions/precision."""
    gold = run.corpus.gold_triples()
    m = extraction_metrics(run.result.extractions, gold)
    agg = m.groupby("predicate")[["tp", "fp"]].sum()
    ann = run.result.annotations
    ann_counts = ann[ann["label"] != "_name"].groupby("label").size()
    ext = run.result.extractions
    ext_counts = (
        ext[ext["predicate"] != "_name"].groupby("predicate").size()
        if not ext.empty
        else pd.Series(dtype=int)
    )
    rows = []
    for pred in ext_counts.sort_values(ascending=False).head(top_k).index:
        tp = agg.loc[pred, "tp"] if pred in agg.index else 0
        fp = agg.loc[pred, "fp"] if pred in agg.index else 0
        p = paper.TABLE9.get(pred, {})
        rows.append(
            {
                "predicate": pred,
                "n_annotations": int(ann_counts.get(pred, 0)),
                "n_extractions": int(ext_counts[pred]),
                "precision": round(float(tp / (tp + fp)), 3) if tp + fp else None,
                "paper_annotations": p.get("annotations"),
                "paper_extractions": p.get("extractions"),
                "paper_precision": p.get("precision"),
            }
        )
    return pd.DataFrame(rows)
