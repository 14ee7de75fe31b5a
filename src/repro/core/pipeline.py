"""End-to-end CERES pipeline (Figure 3): annotate → train → extract.

``run_ceres`` drives the whole flow over a corpus of pages:

1. assign each page to a site group ``grp`` (site, or site#template-cluster
   when a page clustering is supplied);
2. explode pages into text-node rows; identify topics on the training
   half (Algorithm 1); annotate relations (Algorithm 2, or the
   CERES-Topic shortcut); sample negatives;
3. featurize all pages once; train one multinomial LR per group;
4. extract triples from the evaluation pages at the confidence
   threshold.

Everything global is a DataFrame computation; only the per-group model
fits loop on the driver (one ``pyspark.ml`` fit per site, as the paper
trains per-site models).
"""
from __future__ import annotations

from dataclasses import dataclass, field

import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from repro.core.annotate import NAME_LABEL, AnnotateConfig, annotate
from repro.core.extract import extract_triples
from repro.core.features import HASH_DIM, featurize_pages, frequent_strings
from repro.core.matching import kb_to_spark
from repro.core.model import NodeClassifier
from repro.core.negatives import OTHER_LABEL, sample_negatives
from repro.core.topic import TopicConfig, identify_topics
from repro.dom.dataframe import nodes_df, pages_to_df
from repro.kb.generator import KBData

_EXTRACT_COLS = [
    "grp",
    "site",
    "page_id",
    "subject",
    "predicate",
    "object",
    "confidence",
]


@dataclass(frozen=True)
class CeresConfig:
    """Knobs of the pipeline; defaults follow the paper's settings."""

    mode: str = "full"  # "full" = Algorithm 2; "topic" = CERES-Topic
    threshold: float = 0.5
    r_negatives: int = 3
    min_annotations: int = 3
    max_topic_pages: int = 5
    duplication_frac: float = 0.5
    freq_string_frac: float = 0.3
    hash_dim: int = HASH_DIM
    reg_param: float = 1e-3
    max_iter: int = 50
    min_training_pages: int = 2


@dataclass
class CeresResult:
    """Pipeline artifacts, collected to pandas for evaluation."""

    topics: pd.DataFrame
    annotations: pd.DataFrame
    extractions: pd.DataFrame
    labels: dict = field(default_factory=dict)  # grp -> label list


def _with_grp(pages: DataFrame, clusters: dict | None) -> DataFrame:
    if clusters is None:
        return pages.withColumn("grp", F.col("site"))
    spark = pages.sparkSession
    mapping = spark.createDataFrame(
        pd.DataFrame(
            [(k, f"{k.split('/', 1)[0]}#{v}") for k, v in clusters.items()],
            columns=["page_id", "grp"],
        )
    )
    return pages.join(mapping, on="page_id", how="left").fillna(
        {"grp": "unclustered"}
    )


def run_ceres_multi(
    spark: SparkSession,
    pages: list | DataFrame,
    kb: KBData,
    *,
    modes: tuple = ("full",),
    config: CeresConfig = CeresConfig(),
    train_pages: set | None = None,
    eval_pages: set | None = None,
    clusters: dict | None = None,
) -> dict:
    """Run CERES in one or more annotation modes over shared prep work.

    Page parsing, topic identification and featurisation are identical
    for CERES-Full and CERES-Topic, so the Table 5/6 comparisons run
    both modes off one pass. Returns ``{mode: CeresResult}``.
    """
    pages_df = pages if isinstance(pages, DataFrame) else pages_to_df(spark, pages)
    pages_df = _with_grp(pages_df, clusters).cache()

    nodes = nodes_df(pages_df.drop("grp")).join(
        pages_df.select("page_id", "grp"), on="page_id"
    )
    # localCheckpoint (not cache): truncates lineage so the plans the
    # per-site fits compile stay small — chained applyInPandas plans
    # otherwise grow until plan *stringification* itself OOMs the JVM.
    nodes = nodes.select("grp", "vertical", "site", "page_id", "xpath", "text").localCheckpoint()

    train_nodes = (
        nodes
        if train_pages is None
        else nodes.where(F.col("page_id").isin(list(train_pages)))
    )
    kb_df = kb_to_spark(spark, kb).cache()

    topics = identify_topics(
        train_nodes,
        kb_df,
        TopicConfig(max_topic_pages=config.max_topic_pages),
    ).localCheckpoint()

    freq = frequent_strings(nodes, min_frac=config.freq_string_frac)
    features = featurize_pages(pages_df, freq, dim=config.hash_dim).localCheckpoint()
    eval_features = (
        features
        if eval_pages is None
        else features.where(F.col("page_id").isin(list(eval_pages)))
    )

    results = {}
    for mode in modes:
        annotations = annotate(
            train_nodes,
            topics,
            kb_df,
            AnnotateConfig(
                min_annotations=config.min_annotations,
                duplication_frac=config.duplication_frac,
            ),
            mode=mode,
        ).localCheckpoint()
        negatives = sample_negatives(train_nodes, annotations, r=config.r_negatives)
        examples = annotations.unionByName(negatives).localCheckpoint()

        # Keep only topics that survived the informativeness filter
        # (annotate() already dropped their annotations).
        kept_pages = annotations.select("grp", "page_id").distinct()
        topics_pdf = topics.join(kept_pages, on=["grp", "page_id"]).toPandas()
        annotations_pdf = examples.where(F.col("label") != OTHER_LABEL).toPandas()

        extraction_frames, labels_by_grp = [], {}
        grp_stats = (
            examples.groupBy("grp")
            .agg(
                F.countDistinct("page_id").alias("n_pages"),
                F.collect_set("label").alias("labels"),
            )
            .collect()
        )
        for row in sorted(grp_stats, key=lambda r: r["grp"]):
            grp = row["grp"]
            if row["n_pages"] < config.min_training_pages:
                continue
            labels = sorted(set(row["labels"]) | {OTHER_LABEL})
            if len(labels) < 3:  # needs _name + ≥1 relation + OTHER
                continue
            train = examples.where(F.col("grp") == grp).join(
                features.select("grp", "page_id", "xpath", "features"),
                on=["grp", "page_id", "xpath"],
            )
            clf = NodeClassifier(
                labels=labels,
                dim=config.hash_dim,
                reg_param=config.reg_param,
                max_iter=config.max_iter,
            ).fit(train)
            labels_by_grp[grp] = labels
            scored = clf.predict(eval_features.where(F.col("grp") == grp))
            extracted = extract_triples(scored, labels, threshold=config.threshold)
            extraction_frames.append(extracted.toPandas())

        extractions_pdf = (
            pd.concat(extraction_frames, ignore_index=True)
            if extraction_frames
            else pd.DataFrame(columns=_EXTRACT_COLS)
        )
        results[mode] = CeresResult(
            topics=topics_pdf,
            annotations=annotations_pdf,
            extractions=extractions_pdf,
            labels=labels_by_grp,
        )
    return results


def run_ceres(
    spark: SparkSession,
    pages: list | DataFrame,
    kb: KBData,
    *,
    config: CeresConfig = CeresConfig(),
    train_pages: set | None = None,
    eval_pages: set | None = None,
    clusters: dict | None = None,
) -> CeresResult:
    """Run CERES over ``pages`` with seed KB ``kb``.

    ``train_pages``/``eval_pages`` restrict annotation+training and
    extraction respectively (the paper's half/half split); ``None``
    means "all pages". ``clusters`` optionally maps page_id → template
    cluster id (from ``baselines.page_cluster``).
    """
    return run_ceres_multi(
        spark,
        pages,
        kb,
        modes=(config.mode,),
        config=config,
        train_pages=train_pages,
        eval_pages=eval_pages,
        clusters=clusters,
    )[config.mode]
