"""Entity string matching between DOM text fields and the seed KB.

The paper uses the fuzzy matcher of Gulhane et al. [18]; offline we
implement its scalable DataFrame analogue: aggressive normalisation
(Unicode NFKC, casefold, whitespace collapse, edge punctuation strip)
followed by an equality join on the normalised form. The synthetic
sites emit exactly the surface noise this normalisation absorbs.

Also implements the paper's §3.1 mention filters: *stop objects*
(strings participating in a large fraction of KB triples) and
*low-information strings* (short strings, bare numbers/years) are never
topic candidates.
"""
from __future__ import annotations

import re
import unicodedata

import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F
from pyspark.sql.types import StringType

from repro.kb.generator import KBData

_WS = re.compile(r"\s+")
_EDGE_PUNCT = re.compile(r"^[\s\.,;:!\?\"'\(\)\[\]]+|[\s\.,;:!\?\"'\(\)\[\]]+$")


def norm_text(s: str) -> str:
    """Canonical form used for all string matching."""
    if s is None:
        return ""
    s = unicodedata.normalize("NFKC", str(s)).casefold()
    s = _EDGE_PUNCT.sub("", s)
    return _WS.sub(" ", s).strip()


# A DataType instance (not a DDL string) keeps this importable inside
# Spark workers, where no SparkContext exists to parse DDL.
norm_udf = F.udf(norm_text, StringType())


def is_low_info(norm: str) -> bool:
    """Strings too uninformative to be a topic (single digits, years...)."""
    if len(norm) < 3:
        return True
    if norm.isdigit() and len(norm) <= 4:
        return True
    return False


def kb_to_spark(spark: SparkSession, kb: KBData) -> DataFrame:
    """Seed-KB triples as a Spark DataFrame with normalised join keys."""
    pdf = kb.triples.copy()
    pdf["subject_norm"] = pdf["subject_name"].map(norm_text)
    pdf["object_norm"] = pdf["object"].map(norm_text)
    return spark.createDataFrame(
        pdf[
            [
                "subject_id",
                "subject_type",
                "subject_name",
                "predicate",
                "object",
                "subject_norm",
                "object_norm",
            ]
        ]
    )


def kb_entity_strings(kb_df: DataFrame) -> DataFrame:
    """Distinct normalised entity strings known to the KB (subjects ∪ objects)."""
    subs = kb_df.select(F.col("subject_norm").alias("norm"))
    objs = kb_df.select(F.col("object_norm").alias("norm"))
    return subs.union(objs).where(F.length("norm") > 0).distinct()


def stop_objects(kb_df: DataFrame, *, frac: float = 0.05, min_count: int = 30) -> DataFrame:
    """Normalised strings appearing in ≥ max(min_count, frac·|K|) triples.

    These match too promiscuously to identify a topic (§3.1 Step 1).
    The paper's threshold is 0.01% of an 85M-triple KB; against our
    much denser synthetic KBs (every film title is the object of its
    people's inverse triples) the threshold must stay well above a
    single entity's fact count, hence the higher defaults — the intent
    is to catch ubiquitous values like "Public"/"Private", not popular
    entities.
    """
    total = kb_df.count()
    threshold = max(min_count, int(frac * total))
    return (
        kb_df.groupBy("object_norm")
        .agg(F.count("*").alias("n"))
        .where(F.col("n") >= threshold)
        .select(F.col("object_norm").alias("norm"))
    )


def page_mentions(nodes: DataFrame, kb_df: DataFrame) -> DataFrame:
    """All KB-entity mentions on each page.

    Returns ``(grp, page_id, xpath, text, norm)`` — one row per text
    field whose normalised text equals a KB entity string.
    """
    entities = kb_entity_strings(kb_df)
    with_norm = nodes.withColumn("norm", norm_udf(F.col("text")))
    return with_norm.join(entities, on="norm", how="inner").select(
        "grp", "page_id", "xpath", "text", "norm"
    )
