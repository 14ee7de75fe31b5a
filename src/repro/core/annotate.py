"""Algorithm 2 — relation annotation.

Given each page's topic, the KB supplies the triples whose objects may
appear on the page. An object can be mentioned several times (cast list
*and* recommendation strip) and can hold several relations with the
topic (writer *and* director). CERES annotates **at most one** mention
per (predicate, object):

* *local evidence* (``best_local_mention``): prefer the mention whose
  surrounding subtree holds the most objects of the same predicate
  (multi-valued predicates render as lists);
* *global evidence*: break ties — and decide for "frequently
  duplicated" predicates — by preferring mentions whose XPath falls in
  the predicate's largest cross-page cluster (§3.2.2).

The topic node itself is annotated with the synthetic ``_name`` label
(§4: the topic node expresses the *name* relation). Finally the
*informativeness* filter drops pages with fewer than ``min_annotations``
relation annotations.

The CERES-Topic baseline (Table 5/6) bypasses all of this and labels
every mention of every object with every applicable relation.
"""
from __future__ import annotations

from dataclasses import dataclass

import pandas as pd
from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.core.cluster import cluster_xpaths
from repro.core.matching import norm_udf
from repro.kb.schema import NAME_PREDICATES

NAME_LABEL = "_name"

_CAND_COLS = ["grp", "page_id", "predicate", "object_norm", "xpath"]


@dataclass(frozen=True)
class AnnotateConfig:
    min_annotations: int = 3
    duplication_frac: float = 0.5
    cluster_cap: int = 400


def candidate_mentions(nodes: DataFrame, topics: DataFrame, kb_df: DataFrame) -> DataFrame:
    """All (page, predicate, object, xpath) mention candidates.

    A candidate exists where a page's topic has a KB triple whose
    object's normalised string equals a text field on that page.
    """
    topic_triples = (
        topics.join(
            kb_df.withColumnRenamed("subject_norm", "topic_norm"),
            on="topic_norm",
        )
        # Name-like predicates are expressed by the topic node itself
        # (the _name annotation), not by relation mentions.
        .where(~F.col("predicate").isin(list(NAME_PREDICATES)))
        .select("grp", "page_id", "predicate", "object_norm")
    )
    with_norm = nodes.withColumn("object_norm", norm_udf(F.col("text")))
    return (
        topic_triples.join(
            with_norm.select("grp", "page_id", "xpath", "object_norm"),
            on=["grp", "page_id", "object_norm"],
        )
        .select(*_CAND_COLS)
        .distinct()
    )


_CLUSTER_SCHEMA = (
    "grp string, predicate string, xpath string, cluster_id long, cluster_size long"
)


def cluster_assignments(candidates: pd.DataFrame, cap: int = 400) -> pd.DataFrame:
    """Cluster one (grp, predicate) group's candidate xpaths.

    The target number of clusters is the maximum number of mentions of
    a single object on one page (so one page's duplicate mentions can
    land in distinct clusters, §3.2.2). Returns per-xpath cluster sizes,
    weighted by mention multiplicity.
    """
    out = []
    for (grp, pred), sub in candidates.groupby(["grp", "predicate"]):
        per_obj = sub.groupby(["page_id", "object_norm"])["xpath"].nunique()
        n_clusters = int(per_obj.max()) if len(per_obj) else 1
        path_counts = sub.groupby("xpath").size()
        assign = cluster_xpaths(
            list(path_counts.index),
            n_clusters,
            counts=list(path_counts.values),
            cap=cap,
        )
        sizes: dict = {}
        for path, cid in assign.items():
            sizes[cid] = sizes.get(cid, 0) + int(path_counts[path])
        for path, cid in assign.items():
            out.append((grp, pred, path, cid, sizes[cid]))
    return pd.DataFrame(
        out, columns=["grp", "predicate", "xpath", "cluster_id", "cluster_size"]
    )


def cluster_assignments_df(cands: DataFrame, cap: int = 400) -> DataFrame:
    """Distributed clustering: one task per (grp, predicate) group."""
    return cands.groupBy("grp", "predicate").applyInPandas(
        lambda pdf: cluster_assignments(pdf, cap=cap), schema=_CLUSTER_SCHEMA
    )


def _ancestor_prefixes(xpath: str) -> list:
    """All proper ancestor paths, nearest-first."""
    parts = xpath.strip("/").split("/")
    return ["/" + "/".join(parts[:k]) for k in range(len(parts) - 1, 0, -1)]


def best_local_mention(mentions: list, pred_paths: set) -> list:
    """Algorithm 2's BestLocalMention.

    For each mention of the object, find the highest (closest-to-root)
    ancestor containing no *other* mention of the same object, and count
    how many of the predicate's mentions (any object) fall under it.
    Returns all mentions tied for the max count.
    """
    best_count, best = -1, []
    for m in mentions:
        others = [o for o in mentions if o != m]
        anchor = m
        for anc in _ancestor_prefixes(m):  # nearest → root
            if any(o == anc or o.startswith(anc + "/") for o in others):
                break
            anchor = anc
        neighbor = sum(
            1 for p in pred_paths if p == anchor or p.startswith(anchor + "/")
        )
        if neighbor > best_count:
            best_count, best = neighbor, [m]
        elif neighbor == best_count:
            best.append(m)
    return best


def _annotate_page_group(pdf: pd.DataFrame) -> pd.DataFrame:
    """Resolve one page's candidates to ≤1 annotation per (pred, object).

    Input columns: _CAND_COLS + cluster_size + duplicated (bool).
    """
    rows = []
    for pred, sub in pdf.groupby("predicate"):
        pred_paths = set(sub["xpath"])
        for obj, osub in sub.groupby("object_norm"):
            mentions = sorted(osub["xpath"].unique())
            cluster_size = dict(zip(osub["xpath"], osub["cluster_size"]))
            duplicated = bool(osub["duplicated"].iloc[0])
            best = best_local_mention(mentions, pred_paths)
            if len(best) == 1 and not duplicated:
                chosen = best[0]
            else:
                # Global evidence: largest cluster wins; ties by path.
                chosen = max(best, key=lambda p: (cluster_size.get(p, 0), p))
            rows.append(
                (
                    pdf["grp"].iloc[0],
                    pdf["page_id"].iloc[0],
                    chosen,
                    pred,
                    obj,
                )
            )
    return pd.DataFrame(
        rows, columns=["grp", "page_id", "xpath", "label", "object_norm"]
    )


_ANNOT_SCHEMA = "grp string, page_id string, xpath string, label string, object_norm string"


def annotate(
    nodes: DataFrame,
    topics: DataFrame,
    kb_df: DataFrame,
    cfg: AnnotateConfig = AnnotateConfig(),
    *,
    mode: str = "full",
) -> DataFrame:
    """Produce node annotations ``(grp, page_id, xpath, label, object_norm)``.

    ``mode="full"`` runs Algorithm 2; ``mode="topic"`` is the
    CERES-Topic baseline (annotate every mention with every relation).
    Both attach the ``_name`` annotation at the topic node and apply the
    informativeness filter.
    """
    spark = nodes.sparkSession
    cands = candidate_mentions(nodes, topics, kb_df)

    if mode == "topic":
        annotations = cands.select(
            "grp",
            "page_id",
            "xpath",
            F.col("predicate").alias("label"),
            "object_norm",
        ).distinct()
    elif mode == "full":
        cands = cands.cache()
        clusters_df = cluster_assignments_df(cands, cap=cfg.cluster_cap)
        # Frequently-duplicated flag: an object of the predicate recurs
        # (as a candidate) on > duplication_frac of the group's
        # annotated pages.
        n_pages = cands.groupBy("grp").agg(
            F.countDistinct("page_id").alias("n_annot_pages")
        )
        obj_pages = cands.groupBy("grp", "predicate", "object_norm").agg(
            F.countDistinct("page_id").alias("n_obj_pages")
        )
        dup = (
            obj_pages.join(n_pages, on="grp")
            .withColumn("dup_frac", F.col("n_obj_pages") / F.col("n_annot_pages"))
            .groupBy("grp", "predicate")
            .agg(F.max("dup_frac").alias("max_dup_frac"))
            .withColumn("duplicated", F.col("max_dup_frac") > cfg.duplication_frac)
            .select("grp", "predicate", "duplicated")
        )
        enriched = cands.join(
            clusters_df, on=["grp", "predicate", "xpath"], how="left"
        ).join(dup, on=["grp", "predicate"], how="left")
        enriched = enriched.fillna({"cluster_size": 1, "duplicated": False})
        annotations = enriched.groupBy("grp", "page_id").applyInPandas(
            lambda pdf: _annotate_page_group(pdf), schema=_ANNOT_SCHEMA
        )
    else:
        raise ValueError(f"unknown annotation mode: {mode}")

    name_rows = topics.select(
        "grp",
        "page_id",
        F.col("topic_xpath").alias("xpath"),
        F.lit(NAME_LABEL).alias("label"),
        F.col("topic_norm").alias("object_norm"),
    )
    all_annotations = annotations.unionByName(name_rows).distinct()

    # Informativeness (§3.1 Step 3): require min_annotations *relation*
    # annotations on the page; otherwise the page is dropped entirely.
    counts = (
        all_annotations.where(F.col("label") != NAME_LABEL)
        .groupBy("grp", "page_id")
        .agg(F.count("*").alias("n"))
        .where(F.col("n") >= cfg.min_annotations)
        .select("grp", "page_id")
    )
    return all_annotations.join(counts, on=["grp", "page_id"])
