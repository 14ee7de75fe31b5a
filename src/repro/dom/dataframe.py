"""Bridge between generated pages and Spark DataFrames.

The pipeline's spine is two DataFrames:

* **pages**: one row per webpage — ``(vertical, site, page_id, html)``;
* **nodes**: one row per *text field* (DOM node with direct text) —
  ``(vertical, site, page_id, xpath, text)`` — produced by parsing each
  page's HTML per-partition with ``mapInPandas``.

All of CERES's global evidence (path voting, stop entities, frequent
strings, cluster sizes) is computed as DataFrame aggregations over the
nodes DataFrame.
"""
from __future__ import annotations

from typing import Iterable, Iterator

import pandas as pd
from pyspark.sql import DataFrame, SparkSession

PAGES_SCHEMA = "vertical string, site string, page_id string, html string"
NODES_SCHEMA = "vertical string, site string, page_id string, xpath string, text string"


def pages_to_df(spark: SparkSession, pages: Iterable[dict]) -> DataFrame:
    """Materialise generated page dicts as the pages DataFrame.

    Each dict must carry ``vertical``, ``site``, ``page_id``, ``html``.
    """
    pdf = pd.DataFrame(list(pages), columns=["vertical", "site", "page_id", "html"])
    return spark.createDataFrame(pdf, schema=PAGES_SCHEMA)


def nodes_df(pages: DataFrame) -> DataFrame:
    """Explode every page into its text-field nodes (one row per field)."""

    def explode(batches: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
        # Imports inside the worker function so executors resolve them
        # without shipping module state.
        from repro.dom.html import parse_html
        from repro.dom.tree import text_fields

        for pdf in batches:
            rows = []
            for rec in pdf.itertuples(index=False):
                root = parse_html(rec.html)
                for xpath, text in text_fields(root):
                    rows.append((rec.vertical, rec.site, rec.page_id, xpath, text))
            yield pd.DataFrame(
                rows, columns=["vertical", "site", "page_id", "xpath", "text"]
            )

    return pages.mapInPandas(explode, schema=NODES_SCHEMA)
