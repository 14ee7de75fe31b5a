"""Template clustering of webpages (the Vertex clustering step [17]).

Pages generated from one template share most of their *generalised*
XPaths (indices stripped). We shingle each page into that path set
(computed distributedly) and greedily cluster by Jaccard similarity
against cluster representatives. As in the paper (§5.5.1), this is
deliberately a simple implementation: clusters are imperfect, and the
downstream extractor must cope — misclustered or non-detail pages are
one of the paper's observed error classes.
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F
from pyspark.sql.types import ArrayType, StringType

from repro.dom.tree import strip_indices


def page_shingles(nodes: DataFrame) -> DataFrame:
    """Per page, the set of generalised XPaths of its text fields."""
    strip = F.udf(strip_indices, StringType())
    return (
        nodes.withColumn("gpath", strip(F.col("xpath")))
        .groupBy("site", "page_id")
        .agg(F.collect_set("gpath").alias("shingles"))
    )


def cluster_pages(nodes: DataFrame, *, threshold: float = 0.5) -> dict:
    """Greedy template clustering per site.

    Returns ``{page_id: cluster_id}`` with cluster ids local to a site.
    The greedy pass is driver-side over one small row per page (a set of
    a few dozen generalised paths), ordered by page_id for determinism.
    """
    rows = page_shingles(nodes).orderBy("site", "page_id").collect()
    assignment: dict[str, int] = {}
    reps: dict[str, list] = {}  # site -> list of (cluster_id, shingle set)
    for row in rows:
        site, page_id, shingles = row["site"], row["page_id"], set(row["shingles"])
        best_cid, best_sim = None, 0.0
        for cid, rep in reps.setdefault(site, []):
            inter = len(shingles & rep)
            union = len(shingles | rep)
            sim = inter / union if union else 0.0
            if sim > best_sim:
                best_cid, best_sim = cid, sim
        if best_cid is not None and best_sim >= threshold:
            assignment[page_id] = best_cid
        else:
            cid = len(reps[site])
            reps[site].append((cid, shingles))
            assignment[page_id] = cid
    return assignment
