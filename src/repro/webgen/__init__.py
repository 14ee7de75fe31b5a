"""Synthetic semi-structured websites (detail pages + gold labels)."""
from repro.webgen.templates import SiteSpec, SiteData, generate_site
from repro.webgen.corpora import (
    Corpus,
    swde_corpus,
    imdb_corpus,
    commoncrawl_corpus,
)

__all__ = [
    "SiteSpec",
    "SiteData",
    "generate_site",
    "Corpus",
    "swde_corpus",
    "imdb_corpus",
    "commoncrawl_corpus",
]
