"""Algorithm 1 — page topic identification.

Local step: for each page, score every KB subject mentioned on the page
by the Jaccard similarity between the page's mention set and the
subject's KB object set; the argmax is the page's *candidate* topic.

Global steps (all expressed as DataFrame aggregations over the whole
site group ``grp``):

1. *uniqueness* — a string that is the candidate topic of ≥
   ``max_topic_pages`` pages is discarded (e.g. "Help" matching a KB
   entity on every page);
2. *dominant XPath* — count, across the group, the XPaths where
   candidate topics occur; each page then re-resolves its topic from
   the highest-ranked XPath that exists on the page;
3. the informativeness filter (≥ min annotations) is applied later, in
   the annotation step, where annotation counts are known.
"""
from __future__ import annotations

from dataclasses import dataclass

from pyspark.sql import DataFrame, Window
from pyspark.sql import functions as F

from repro.core.matching import is_low_info, page_mentions, stop_objects


@dataclass(frozen=True)
class TopicConfig:
    max_topic_pages: int = 5
    stop_frac: float = 0.05
    stop_min_count: int = 30


def score_topic_candidates(nodes: DataFrame, kb_df: DataFrame, cfg: TopicConfig) -> DataFrame:
    """Jaccard score for every (page, candidate subject) pair.

    Returns ``(grp, page_id, subject_norm, score)``.
    """
    mentions = page_mentions(nodes, kb_df)
    page_ents = mentions.select("grp", "page_id", "norm").distinct()
    page_size = page_ents.groupBy("grp", "page_id").agg(
        F.count("*").alias("page_set_size")
    )

    kb_pairs = kb_df.select("subject_norm", "object_norm").distinct()
    ent_size = kb_pairs.groupBy("subject_norm").agg(
        F.count("*").alias("entity_set_size")
    )

    # |pageSet ∩ entitySet_j|: distinct KB objects of subject j present
    # on the page.
    inter = (
        page_ents.join(kb_pairs, page_ents["norm"] == kb_pairs["object_norm"])
        .groupBy("grp", "page_id", "subject_norm")
        .agg(F.countDistinct("object_norm").alias("inter"))
    )

    low_info = F.udf(is_low_info, "boolean")
    stops = stop_objects(kb_df, frac=cfg.stop_frac, min_count=cfg.stop_min_count)
    # Candidate subjects must themselves be mentioned on the page and
    # survive the stop/low-info filters.
    mentioned_subjects = page_ents.withColumnRenamed("norm", "subject_norm").join(
        stops.withColumnRenamed("norm", "subject_norm"), on="subject_norm", how="left_anti"
    )
    mentioned_subjects = mentioned_subjects.where(~low_info(F.col("subject_norm")))

    return (
        inter.join(mentioned_subjects, on=["grp", "page_id", "subject_norm"])
        .join(page_size, on=["grp", "page_id"])
        .join(ent_size, on="subject_norm")
        .withColumn(
            "score",
            F.col("inter")
            / (F.col("page_set_size") + F.col("entity_set_size") - F.col("inter")),
        )
        .select("grp", "page_id", "subject_norm", "score")
    )


def identify_topics(nodes: DataFrame, kb_df: DataFrame, cfg: TopicConfig = TopicConfig()) -> DataFrame:
    """Run Algorithm 1; returns ``(grp, page_id, topic_norm, topic_text,
    topic_xpath, score)`` for pages where a topic was found."""
    scores = score_topic_candidates(nodes, kb_df, cfg).cache()
    mentions = page_mentions(nodes, kb_df)

    # Local argmax candidate per page (deterministic tie-break).
    w = Window.partitionBy("grp", "page_id").orderBy(
        F.desc("score"), F.asc("subject_norm")
    )
    candidates = (
        scores.withColumn("rank", F.row_number().over(w))
        .where(F.col("rank") == 1)
        .drop("rank")
    )

    # Global step 1 — uniqueness: drop candidates claiming many pages.
    claims = candidates.groupBy("grp", "subject_norm").agg(
        F.count("*").alias("n_pages")
    )
    candidates = candidates.join(
        claims.where(F.col("n_pages") < cfg.max_topic_pages).drop("n_pages"),
        on=["grp", "subject_norm"],
    )

    # Global step 2 — dominant XPath: where do candidate topics live?
    cand_mentions = mentions.join(
        candidates.select("grp", "page_id", F.col("subject_norm").alias("norm")),
        on=["grp", "page_id", "norm"],
    )
    path_counts = cand_mentions.groupBy("grp", "xpath").agg(
        F.count("*").alias("path_count")
    )

    # For each page, the best-ranked path among paths that exist on the
    # page *and* hold a scored candidate string.
    mention_scores = mentions.join(
        scores.withColumnRenamed("subject_norm", "norm"),
        on=["grp", "page_id", "norm"],
    )
    ranked = mention_scores.join(path_counts, on=["grp", "xpath"])
    w2 = Window.partitionBy("grp", "page_id").orderBy(
        F.desc("path_count"), F.asc("xpath"), F.desc("score"), F.asc("norm")
    )
    topics = (
        ranked.withColumn("rank", F.row_number().over(w2))
        .where(F.col("rank") == 1)
        .select(
            "grp",
            "page_id",
            F.col("norm").alias("topic_norm"),
            F.col("text").alias("topic_text"),
            F.col("xpath").alias("topic_xpath"),
            "score",
        )
    )
    return topics
