"""Extraction (§4.3): apply the node classifier to every page.

Per page: if a ``_name`` node can be identified (highest-probability
name prediction), its text becomes the subject; every other node whose
top predicted class is a relation with confidence ≥ the threshold
becomes an object of a ``(subject, predicate, object)`` extraction.
Varying the threshold trades precision for recall (Figure 6).
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import DataFrame, Window
from pyspark.sql import functions as F

from repro.core.annotate import NAME_LABEL
from repro.core.negatives import OTHER_LABEL


def extract_triples(
    scored: DataFrame,
    labels: list,
    *,
    threshold: float = 0.5,
) -> DataFrame:
    """Turn classifier scores into triples.

    ``scored``: ``(grp, site, page_id, xpath, text, probs)`` rows;
    ``labels`` maps probability indices to label strings.
    Returns ``(grp, site, page_id, subject, predicate, object, confidence)``.
    """
    n = len(labels)
    pad = F.udf(
        lambda p: (list(p) + [0.0] * n)[:n], "array<double>"
    )
    scored = scored.withColumn("p", pad(F.col("probs")))
    name_idx = labels.index(NAME_LABEL) if NAME_LABEL in labels else -1

    # Subject: the page's best _name node above threshold.
    if name_idx < 0:
        return scored.sparkSession.createDataFrame(
            [],
            schema="grp string, site string, page_id string, subject string, "
            "predicate string, object string, confidence double",
        )
    scored = scored.withColumn("name_prob", F.col("p")[name_idx]).cache()
    w = Window.partitionBy("grp", "page_id").orderBy(
        F.desc("name_prob"), F.asc("xpath")
    )
    names = (
        scored.withColumn("rk", F.row_number().over(w))
        .where((F.col("rk") == 1) & (F.col("name_prob") >= threshold))
        .select(
            "grp",
            "site",
            "page_id",
            F.col("xpath").alias("name_xpath"),
            F.col("text").alias("subject"),
            F.col("name_prob"),
        )
    )

    # Top class + confidence per node.
    @F.udf("struct<label_i:int, conf:double>")
    def top(p):
        best = max(range(len(p)), key=lambda i: p[i])
        return (best, float(p[best]))

    preds = (
        scored.withColumn("top", top(F.col("p")))
        .withColumn("label_i", F.col("top.label_i"))
        .withColumn("confidence", F.col("top.conf"))
    )
    label_arr = F.array(*[F.lit(l) for l in labels])
    preds = preds.withColumn("predicate", label_arr[F.col("label_i")])
    out = (
        preds.join(names.drop("site", "name_prob"), on=["grp", "page_id"])
        .where(F.col("xpath") != F.col("name_xpath"))
        .where(~F.col("predicate").isin([NAME_LABEL, OTHER_LABEL]))
        .where(F.col("confidence") >= threshold)
        .select(
            "grp",
            "site",
            "page_id",
            "subject",
            "predicate",
            F.col("text").alias("object"),
            "confidence",
        )
    )
    # The name node itself is reported as a ``_name`` extraction so the
    # per-predicate tables can score the Title/Name rows.
    name_rows = names.select(
        "grp",
        "site",
        "page_id",
        "subject",
        F.lit(NAME_LABEL).alias("predicate"),
        F.col("subject").alias("object"),
        F.col("name_prob").alias("confidence"),
    )
    return out.unionByName(name_rows)
