"""Shared expensive fixtures: corpora and pipeline runs.

Heavy Spark experiments are session-scoped so table tests, pipeline
tests and metrics tests all read from the same run instead of
re-training models per test module.
"""
import pytest

from repro.core.pipeline import CeresConfig, run_ceres_multi
from repro.eval import tables
from repro.webgen.corpora import CCRAWL_SITES, imdb_corpus, swde_corpus


@pytest.fixture(scope="session")
def nba_corpus():
    return swde_corpus("nbaplayer", n_sites=2, pages_per_site=12, seed=0)


@pytest.fixture(scope="session")
def movie_corpus():
    return swde_corpus("movie", n_sites=2, pages_per_site=12, seed=0)


@pytest.fixture(scope="session")
def imdb_small():
    return imdb_corpus(n_film_pages=14, n_person_pages=10, n_episode_pages=6, seed=0)


def _split(corpus):
    ids = sorted(p["page_id"] for p in corpus.pages)
    return set(ids[::2]), set(ids[1::2])


@pytest.fixture(scope="session")
def nba_run(spark, nba_corpus):
    """CERES full+topic on the NBA corpus with a half/half split."""
    train, eval_pages = _split(nba_corpus)
    results = run_ceres_multi(
        spark,
        nba_corpus.pages,
        nba_corpus.kb,
        modes=("full", "topic"),
        train_pages=train,
        eval_pages=eval_pages,
    )
    return {"results": results, "train": train, "eval": eval_pages}


@pytest.fixture(scope="session")
def swde_runs(spark):
    """Tiny two-vertical SWDE experiment with all four systems."""
    return tables.swde_experiment(
        spark,
        verticals=("nbaplayer", "university"),
        n_sites=2,
        pages_per_site=10,
        baseline_pair_budget=200_000,
    )


@pytest.fixture(scope="session")
def imdb_run(spark):
    return tables.imdb_experiment(
        spark, n_film_pages=16, n_person_pages=14, n_episode_pages=6
    )


#: Subset of sites covering the quirk classes: clean/high-overlap,
#: superset-genre lists, role merging, date charts, chart-only.
CC_TEST_SITES = [s for s in CCRAWL_SITES if s[0] in {
    "themoviedb.example",
    "laborfilms.example",
    "spicyonion.example",
    "the-numbers.example",
    "boxofficemojo.example",
    "bcdb.example",
}]


@pytest.fixture(scope="session")
def cc_run(spark):
    return tables.commoncrawl_experiment(
        spark, pages_base=10, sites=CC_TEST_SITES
    )
