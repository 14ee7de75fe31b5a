"""Site/page generation and corpus builders."""
import numpy as np
import pandas as pd
import pytest

from repro.dom.html import parse_html
from repro.dom.tree import PageIndex
from repro.kb.generator import GENRES, build_world
from repro.webgen.corpora import (
    CCRAWL_SITES,
    SWDE_PREDICATES,
    commoncrawl_corpus,
    imdb_corpus,
    swde_corpus,
)
from repro.webgen.templates import LABELS_EN, SiteSpec, generate_site


@pytest.fixture(scope="module")
def movie_world():
    return build_world("movie", seed=9, n_films=20, n_people=60)


def _site(world, **kw):
    defaults = dict(
        name="t.example",
        vertical="movie",
        entity_type="film",
        predicates=["title", "directed_by", "genre", "release_date"],
        seed=4,
    )
    defaults.update(kw)
    spec = SiteSpec(**defaults)
    films = world.of_type("film")[:8]
    return generate_site(spec, world, films), films


class TestGenerateSite:
    def test_page_count(self, movie_world):
        data, films = _site(movie_world)
        assert len(data.pages) == len(films)

    def test_gold_xpaths_exist_in_dom(self, movie_world):
        data, _ = _site(movie_world)
        pages = {p["page_id"]: p["html"] for p in data.pages}
        for pid, grp in data.gold_nodes.groupby("page_id"):
            idx = PageIndex(parse_html(pages[pid]))
            for rec in grp.itertuples():
                assert rec.xpath in idx

    def test_gold_node_text_matches_object(self, movie_world):
        data, _ = _site(movie_world)
        pages = {p["page_id"]: p["html"] for p in data.pages}
        from repro.core.matching import norm_text

        for pid, grp in data.gold_nodes.groupby("page_id"):
            idx = PageIndex(parse_html(pages[pid]))
            for rec in grp.itertuples():
                assert norm_text(idx.node(rec.xpath).text) == norm_text(rec.object)

    def test_every_detail_page_has_topic_and_title_gold(self, movie_world):
        data, films = _site(movie_world)
        assert set(data.topics["topic"]) == {f.name for f in films}
        titles = data.gold_nodes[data.gold_nodes["predicate"] == "title"]
        assert len(titles) == len(films)

    def test_deterministic(self, movie_world):
        d1, _ = _site(movie_world)
        d2, _ = _site(movie_world)
        assert [p["html"] for p in d1.pages] == [p["html"] for p in d2.pages]

    def test_sites_with_different_seeds_differ(self, movie_world):
        d1, _ = _site(movie_world, seed=4)
        d2, _ = _site(movie_world, name="u.example", seed=99)
        assert d1.pages[0]["html"] != d2.pages[0]["html"]

    def test_label_lang_changes_labels(self, movie_world):
        d1, _ = _site(movie_world, label_lang="xx")
        assert LABELS_EN["directed_by"] not in d1.pages[0]["html"]

    def test_all_genres_quirk_lists_every_genre(self, movie_world):
        data, films = _site(movie_world, all_genres_everywhere=True)
        html = data.pages[0]["html"]
        assert all(g in html for g in GENRES)
        # gold still only the true genres
        g0 = data.gold_nodes[
            (data.gold_nodes["page_id"] == data.pages[0]["page_id"])
            & (data.gold_nodes["predicate"] == "genre")
        ]
        assert set(g0["object"]) == set(films[0].facts["genre"])

    def test_date_lists_quirk(self, movie_world):
        data, films = _site(movie_world, date_lists=True)
        g0 = data.gold_nodes[data.gold_nodes["predicate"] == "release_date"]
        # exactly one gold date per page despite the decoy chart
        assert (g0.groupby("page_id").size() == 1).all()

    def test_non_detail_pages_have_no_topic(self, movie_world):
        data, _ = _site(movie_world, non_detail_frac=0.5)
        chart = data.topics[data.topics["topic"].isna()]
        assert len(chart) > 0
        assert not set(chart["page_id"]) & set(data.gold_nodes["page_id"])

    def test_chart_only_site(self, movie_world):
        spec_kw = dict(non_detail_frac=1.0, n_pages=5)
        data, _ = _site(movie_world, **spec_kw)
        assert len(data.pages) == 5
        assert data.gold_nodes.empty

    def test_merge_roles_puts_roles_in_one_list(self, movie_world):
        spec = SiteSpec(
            name="p.example",
            vertical="movie",
            entity_type="person",
            predicates=["name", "acted_in", "director_of"],
            seed=3,
            merge_roles=True,
        )
        people = [p for p in movie_world.of_type("person") if p.facts.get("acted_in")][:4]
        data = generate_site(spec, movie_world, people)
        labels = data.gold_nodes["predicate"].unique()
        assert "acted_in" in labels
        html = data.pages[0]["html"]
        assert LABELS_EN["filmography"] in html
        assert LABELS_EN["acted_in"] not in html


class TestSwdeCorpus:
    @pytest.mark.parametrize("vertical", list(SWDE_PREDICATES))
    def test_builds(self, vertical):
        c = swde_corpus(vertical, n_sites=2, pages_per_site=8)
        assert len(c.sites) == 2
        assert len(c.pages) == 16
        assert c.kb.n_triples > 0

    def test_movie_kb_lacks_mpaa(self):
        c = swde_corpus("movie", n_sites=2, pages_per_site=8)
        assert (c.kb.triples["predicate"] == "mpaa_rating").sum() == 0

    def test_book_low_overlap(self):
        c = swde_corpus("book", n_sites=3, pages_per_site=10)
        kb_names = set(c.kb.triples["subject_name"])
        other = c.sites[1]
        on_site = set(other.topics["topic"])
        assert len(on_site & kb_names) < len(on_site) * 0.6

    def test_nba_high_overlap(self):
        c = swde_corpus("nbaplayer", n_sites=2, pages_per_site=10)
        kb_names = set(c.kb.triples["subject_name"])
        other = c.sites[1]
        on_site = set(other.topics["topic"])
        assert len(on_site & kb_names) >= len(on_site) * 0.7

    def test_gold_triples_have_subjects(self):
        c = swde_corpus("nbaplayer", n_sites=2, pages_per_site=6)
        gt = c.gold_triples()
        assert gt["subject"].notna().all()
        assert {"vertical", "site", "page_id", "subject", "predicate", "object"} <= set(
            gt.columns
        )


class TestImdbCorpus:
    @pytest.fixture(scope="class")
    def corpus(self):
        return imdb_corpus(n_film_pages=8, n_person_pages=6, n_episode_pages=4)

    def test_two_templates_one_site(self, corpus):
        assert len(corpus.sites) == 2
        assert len({s.spec.name for s in corpus.sites}) == 1

    def test_person_pages_have_known_for(self, corpus):
        person_site = next(s for s in corpus.sites if s.spec.template_id == "person")
        assert any("Known For" in p["html"] for p in person_site.pages)

    def test_kb_bias_reduces_cast_coverage(self, corpus):
        world_triples = corpus.world.triples()
        n_world = (world_triples["predicate"] == "has_cast_member").sum()
        n_kb = (corpus.kb.triples["predicate"] == "has_cast_member").sum()
        assert n_kb < 0.6 * n_world

    def test_episode_pages_rendered(self, corpus):
        film_site = next(s for s in corpus.sites if s.spec.template_id == "film")
        assert (film_site.gold_nodes["predicate"] == "episode_number").any()


class TestCommonCrawlCorpus:
    @pytest.fixture(scope="class")
    def corpus(self):
        sites = [s for s in CCRAWL_SITES if s[0] in {
            "themoviedb.example", "boxofficemojo.example", "spicyonion.example"
        }]
        return commoncrawl_corpus(pages_base=6, sites=sites)

    def test_site_roster(self, corpus):
        assert {s.spec.name for s in corpus.sites} == {
            "themoviedb.example", "boxofficemojo.example", "spicyonion.example"
        }

    def test_boxofficemojo_all_charts(self, corpus):
        bom = next(s for s in corpus.sites if s.spec.name == "boxofficemojo.example")
        assert bom.gold_nodes.empty
        assert bom.topics["topic"].isna().all()

    def test_person_site_uses_person_entities(self, corpus):
        spicy = next(s for s in corpus.sites if s.spec.name == "spicyonion.example")
        assert spicy.spec.entity_type == "person"

    def test_full_roster_builds(self):
        c = commoncrawl_corpus(pages_base=3)
        assert len(c.sites) == len(CCRAWL_SITES)

    def test_focus_recorded(self, corpus):
        assert all(hasattr(s, "focus") for s in corpus.sites)
