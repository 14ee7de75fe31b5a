"""Synthetic worlds and seed-KB subsampling."""
import pytest

from repro.kb.generator import (
    build_world,
    kb_from_entities,
    person_names,
    film_titles,
    world_to_kb,
)
from repro.kb.schema import MOVIE, ONTOLOGIES
import numpy as np


class TestVocab:
    def test_person_names_unique(self):
        rng = np.random.default_rng(0)
        names = person_names(rng, 200)
        assert len(set(names)) == 200

    def test_film_titles_unique(self):
        rng = np.random.default_rng(0)
        titles = film_titles(rng, 150)
        assert len(set(titles)) == 150

    def test_deterministic(self):
        a = person_names(np.random.default_rng(7), 20)
        b = person_names(np.random.default_rng(7), 20)
        assert a == b


class TestMovieWorld:
    @pytest.fixture(scope="class")
    def world(self):
        return build_world("movie", seed=1, n_films=30, n_people=80)

    def test_entity_types(self, world):
        types = {e.type for e in world.entities.values()}
        assert types == {"person", "film", "tv_series", "tv_episode"}

    def test_counts(self, world):
        assert len(world.of_type("film")) == 30
        assert len(world.of_type("person")) == 80

    def test_inverse_consistency_directors(self, world):
        for film in world.of_type("film"):
            for d in film.facts.get("directed_by", []):
                person = next(p for p in world.of_type("person") if p.name == d)
                assert film.name in person.facts.get("director_of", [])

    def test_inverse_consistency_cast(self, world):
        film = world.of_type("film")[0]
        for c in film.facts.get("has_cast_member", []):
            person = next(p for p in world.of_type("person") if p.name == c)
            assert film.name in person.facts.get("acted_in", [])

    def test_writer_director_overlap_exists(self, world):
        overlap = sum(
            1
            for f in world.of_type("film")
            if set(f.facts["directed_by"]) & set(f.facts["written_by"])
        )
        assert overlap >= 5  # §3.2's ambiguity must be represented

    def test_films_have_required_facts(self, world):
        for f in world.of_type("film"):
            for pred in ("title", "release_date", "release_year", "genre", "mpaa_rating"):
                assert f.facts.get(pred), pred

    def test_episode_facts(self, world):
        ep = world.of_type("tv_episode")[0]
        assert ep.facts["episode_number"] and ep.facts["season_number"]
        assert ep.facts["series"]

    def test_predicates_exist_in_ontology(self, world):
        allowed = set(MOVIE.all_predicates())
        for e in world.entities.values():
            assert set(e.facts) <= allowed, set(e.facts) - allowed

    def test_deterministic(self):
        w1 = build_world("movie", seed=3, n_films=10, n_people=30)
        w2 = build_world("movie", seed=3, n_films=10, n_people=30)
        assert w1.triples().equals(w2.triples())

    def test_triples_frame_shape(self, world):
        t = world.triples()
        assert list(t.columns) == [
            "subject_id",
            "subject_type",
            "subject_name",
            "predicate",
            "object",
        ]
        assert len(t) > 500


@pytest.mark.parametrize("vertical", ["book", "nbaplayer", "university"])
def test_other_worlds(vertical):
    world = build_world(vertical, seed=0)
    ont = ONTOLOGIES[vertical]
    etype = list(ont.predicates)[0]
    ents = world.of_type(etype)
    assert len(ents) > 50
    for e in ents[:10]:
        assert set(e.facts) <= set(ont.predicates[etype])


class TestWorldToKb:
    @pytest.fixture(scope="class")
    def world(self):
        return build_world("movie", seed=2, n_films=20, n_people=60)

    def test_full_coverage(self, world):
        kb = world_to_kb(world)
        assert kb.n_triples == len(world.triples())

    def test_entity_coverage_subsamples(self, world):
        kb = world_to_kb(world, entity_coverage=0.5, seed=0)
        assert 0.3 < len(kb.entities) / len(world.entities) < 0.7

    def test_predicate_coverage_zero_drops_all(self, world):
        kb = world_to_kb(world, predicate_coverage={"mpaa_rating": 0.0})
        assert (kb.triples["predicate"] == "mpaa_rating").sum() == 0

    def test_predicate_coverage_partial(self, world):
        full = world_to_kb(world)
        biased = world_to_kb(world, predicate_coverage={"has_cast_member": 0.2}, seed=1)
        n_full = (full.triples["predicate"] == "has_cast_member").sum()
        n_biased = (biased.triples["predicate"] == "has_cast_member").sum()
        assert 0.05 < n_biased / n_full < 0.45

    def test_names_always_kept(self, world):
        kb = world_to_kb(world, predicate_coverage={"title": 0.0, "name": 0.0})
        covered = set(kb.entities["entity_id"])
        with_name = set(
            kb.triples[kb.triples["predicate"].isin(["title", "name"])]["subject_id"]
        )
        named_in_world = {
            eid
            for eid in covered
            if {"title", "name"} & set(world.entities[eid].facts)
        }
        assert named_in_world <= with_name

    def test_kb_from_entities_exact(self, world):
        ids = sorted(world.entities)[:5]
        kb = kb_from_entities(world, ids)
        assert set(kb.entities["entity_id"]) == set(ids)

    def test_deterministic(self, world):
        a = world_to_kb(world, entity_coverage=0.6, seed=5)
        b = world_to_kb(world, entity_coverage=0.6, seed=5)
        assert a.triples.equals(b.triples)
