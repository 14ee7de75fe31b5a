"""Synthetic worlds and seed KBs.

A **world** is the ground-truth universe a vertical's websites render:
entities with names and facts (predicate → list of object strings),
inverse-consistent (``acted_in`` mirrors ``has_cast_member``). A **seed
KB** is a (possibly biased) subsample of a world — the paper's §5.4
footnote reports the IMDb seed KB covers only ~14% of cast facts, 9% of
producer, 38% of director and 58% of genre facts, which we reproduce
with per-predicate keep probabilities.

Everything is deterministic in ``seed``.
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np
import pandas as pd

from repro.kb.schema import MOVIE, NAME_PREDICATES

# ---------------------------------------------------------------- vocab

_FIRST = [
    "Ada", "Ben", "Cara", "Devi", "Emil", "Fay", "Goro", "Hana", "Ivor",
    "Jia", "Kofi", "Lena", "Milo", "Nadia", "Omar", "Petra", "Quinn",
    "Rosa", "Sven", "Talia", "Umar", "Vera", "Wim", "Xena", "Yuri", "Zola",
    "Anselm", "Beatrix", "Casimir", "Dorothea", "Edmund", "Fiora",
]
_LAST = [
    "Abara", "Bellini", "Cormack", "Dvorak", "Eriksen", "Falco", "Grieg",
    "Hartmann", "Ishida", "Jansen", "Kovacs", "Lindqvist", "Moreau",
    "Nakamura", "Okafor", "Petrov", "Quispe", "Rinaldi", "Sorensen",
    "Takahashi", "Ulloa", "Vasquez", "Weiss", "Xu", "Yamada", "Zheng",
    "Almeida", "Bergstrom", "Castellano", "Dimitrov", "Engelhardt",
]
_ADJ = [
    "Silent", "Crimson", "Hidden", "Last", "Broken", "Golden", "Wandering",
    "Forgotten", "Burning", "Distant", "Hollow", "Iron", "Restless",
    "Scarlet", "Velvet", "Winter", "Midnight", "Savage", "Gentle", "Pale",
]
_NOUN = [
    "River", "Harbor", "Mountain", "Garden", "Mirror", "Lantern", "Orchard",
    "Станция", "Tempest", "Voyage", "Meadow", "Fortress", "Signal", "Ember",
    "Horizon", "Crossing", "Shadow", "Carnival", "Archive", "Monsoon",
]
GENRES = [
    "Drama", "Comedy", "Thriller", "Horror", "Romance", "Documentary",
    "Animation", "Action", "Mystery", "Western", "Musical", "Crime",
    "Fantasy", "Adventure", "Biography", "War", "Sport", "Noir",
]
_PLACES = [
    "Riverton", "Harborview", "Eastmoor", "Westfall", "Northgate",
    "Lakewood", "Stonebridge", "Fairhaven", "Oakdale", "Millbrook",
    "Ashford", "Brookside", "Cedar Falls", "Dunmore", "Elmsworth",
]
_MPAA = ["G", "PG", "PG-13", "R", "NC-17"]
_TEAMS = [
    "Riverton Hawks", "Harborview Sharks", "Eastmoor Kings",
    "Westfall Giants", "Northgate Bulls", "Lakewood Storm",
    "Stonebridge Wolves", "Fairhaven Comets", "Oakdale Raptors",
    "Millbrook Heat", "Ashford Suns", "Brookside Jazz",
]
_PUBLISHERS = [
    "Lantern Press", "Orchard House", "Meridian Books", "Quill & Crane",
    "Harborlight Publishing", "Stonegate Editions", "Vellum & Vine",
    "Northwind Press",
]


def _unique_names(rng: np.random.Generator, n: int, builder) -> list[str]:
    """Draw distinct names; suffix a counter when the vocab saturates."""
    seen: set[str] = set()
    out: list[str] = []
    tries = 0
    while len(out) < n:
        name = builder(rng)
        tries += 1
        if name in seen:
            if tries > 4 * n + 100:
                name = f"{name} {len(out) + 1}"
            else:
                continue
        seen.add(name)
        out.append(name)
    return out


def person_names(rng: np.random.Generator, n: int) -> list[str]:
    return _unique_names(
        rng, n, lambda g: f"{g.choice(_FIRST)} {g.choice(_LAST)}"
    )


def film_titles(rng: np.random.Generator, n: int) -> list[str]:
    def build(g: np.random.Generator) -> str:
        style = g.integers(0, 3)
        if style == 0:
            return f"The {g.choice(_ADJ)} {g.choice(_NOUN)}"
        if style == 1:
            return f"{g.choice(_NOUN)} of {g.choice(_NOUN)}"
        return f"{g.choice(_ADJ)} {g.choice(_NOUN)}"

    return _unique_names(rng, n, build)


def _date(rng: np.random.Generator) -> tuple[str, str]:
    """(ISO date, year) between 1950 and 2017."""
    y = int(rng.integers(1950, 2018))
    m = int(rng.integers(1, 13))
    d = int(rng.integers(1, 29))
    return f"{y:04d}-{m:02d}-{d:02d}", str(y)


# ---------------------------------------------------------------- model


@dataclass
class Entity:
    """One world entity: identity plus its facts."""

    id: str
    type: str
    name: str
    facts: dict = field(default_factory=dict)  # predicate -> [object strings]

    def add(self, predicate: str, obj: str) -> None:
        vals = self.facts.setdefault(predicate, [])
        if obj not in vals:
            vals.append(obj)


@dataclass
class World:
    """Ground-truth universe for one vertical."""

    vertical: str
    entities: dict = field(default_factory=dict)  # id -> Entity

    def add(self, ent: Entity) -> Entity:
        self.entities[ent.id] = ent
        return ent

    def of_type(self, t: str) -> list[Entity]:
        return [e for e in self.entities.values() if e.type == t]

    def triples(self) -> pd.DataFrame:
        rows = [
            (e.id, e.type, e.name, p, o)
            for e in self.entities.values()
            for p, objs in e.facts.items()
            for o in objs
        ]
        return pd.DataFrame(
            rows,
            columns=["subject_id", "subject_type", "subject_name", "predicate", "object"],
        )


@dataclass
class KBData:
    """Seed knowledge base: entity roster + triple store (pandas)."""

    entities: pd.DataFrame  # entity_id, entity_type, name
    triples: pd.DataFrame  # subject_id, subject_type, subject_name, predicate, object

    @property
    def n_triples(self) -> int:
        return len(self.triples)


# ------------------------------------------------------------ factories


def build_movie_world(
    seed: int = 0,
    *,
    n_films: int = 120,
    n_people: int = 260,
    n_series: int = 10,
    n_episodes: int = 60,
) -> World:
    """Movie/TV world with inverse-consistent filmographies.

    Writer/director overlap is deliberate (~40% of films share one person
    across the two roles) — the ambiguity §3.2 calls out.
    """
    rng = np.random.default_rng(seed)
    world = World(vertical="movie")

    people = [
        world.add(Entity(id=f"p{i}", type="person", name=nm))
        for i, nm in enumerate(person_names(rng, n_people))
    ]
    for person in people:
        person.add("name", person.name)
        person.add("place_of_birth", str(rng.choice(_PLACES)))
        if rng.random() < 0.35:
            first = person.name.split()[0]
            person.add("alias", f"{first[0]}. {person.name.split()[1]}")

    films = [
        world.add(Entity(id=f"f{i}", type="film", name=t))
        for i, t in enumerate(film_titles(rng, n_films))
    ]
    for film in films:
        film.add("title", film.name)
        date, year = _date(rng)
        film.add("release_date", date)
        film.add("release_year", year)
        film.add("mpaa_rating", str(rng.choice(_MPAA)))
        for g in rng.choice(GENRES, size=int(rng.integers(1, 4)), replace=False):
            film.add("genre", str(g))
        directors = list(rng.choice(people, size=int(rng.integers(1, 3)), replace=False))
        writers = list(rng.choice(people, size=int(rng.integers(1, 4)), replace=False))
        if rng.random() < 0.4:  # writer == director overlap
            writers[0] = directors[0]
        cast = list(rng.choice(people, size=int(rng.integers(5, 15)), replace=False))
        composer = people[int(rng.integers(0, len(people)))]
        for d in directors:
            film.add("directed_by", d.name)
            d.add("director_of", film.name)
        for w in writers:
            film.add("written_by", w.name)
            w.add("writer_of", film.name)
        for c in cast:
            film.add("has_cast_member", c.name)
            c.add("acted_in", film.name)
        film.add("music_by", composer.name)
        composer.add("created_music_for", film.name)
        # Producers exist in filmographies even though film pages don't
        # list them prominently (the paper's producer_of pain point).
        for pr in rng.choice(people, size=int(rng.integers(1, 3)), replace=False):
            pr.add("producer_of", film.name)

    series_list = [
        world.add(Entity(id=f"s{i}", type="tv_series", name=f"{t} (TV Series)"))
        for i, t in enumerate(film_titles(rng, n_series))
    ]
    for s in series_list:
        s.add("title", s.name)
        for g in rng.choice(GENRES, size=2, replace=False):
            s.add("genre", str(g))
    for i in range(n_episodes):
        series = series_list[i % len(series_list)]
        season = 1 + (i // len(series_list)) % 3
        epnum = 1 + i % 8
        ep = world.add(
            Entity(
                id=f"e{i}",
                type="tv_episode",
                name=f"{series.name.replace(' (TV Series)', '')}: Episode {epnum}",
            )
        )
        ep.add("title", ep.name)
        ep.add("episode_number", str(epnum))
        ep.add("season_number", str(season))
        ep.add("series", series.name)
        _, year = _date(rng)
        ep.add("release_year", year)
        for c in rng.choice(people, size=3, replace=False):
            ep.add("has_cast_member", c.name)
            c.add("acted_in", ep.name)
        d = people[int(rng.integers(0, len(people)))]
        ep.add("directed_by", d.name)
        d.add("director_of", ep.name)
    return world


def build_book_world(seed: int = 1, *, n_books: int = 150, n_authors: int = 90) -> World:
    rng = np.random.default_rng(seed)
    world = World(vertical="book")
    authors = person_names(rng, n_authors)
    for i, title in enumerate(film_titles(rng, n_books)):
        b = world.add(Entity(id=f"b{i}", type="book", name=title))
        b.add("title", title)
        for a in rng.choice(authors, size=int(rng.integers(1, 3)), replace=False):
            b.add("author", str(a))
        isbn = "978" + "".join(str(int(x)) for x in rng.integers(0, 10, 10))
        b.add("isbn13", isbn)
        b.add("publisher", str(rng.choice(_PUBLISHERS)))
        date, _ = _date(rng)
        b.add("publication_date", date)
    return world


def build_nba_world(seed: int = 2, *, n_players: int = 120) -> World:
    rng = np.random.default_rng(seed)
    world = World(vertical="nbaplayer")
    for i, nm in enumerate(person_names(rng, n_players)):
        p = world.add(Entity(id=f"n{i}", type="player", name=nm))
        p.add("name", nm)
        p.add("team", str(rng.choice(_TEAMS)))
        feet, inches = int(rng.integers(5, 8)), int(rng.integers(0, 12))
        p.add("height", f"{feet}-{inches}")
        p.add("weight", f"{int(rng.integers(160, 300))} lbs")
    return world


def build_university_world(seed: int = 3, *, n_universities: int = 120) -> World:
    rng = np.random.default_rng(seed)
    world = World(vertical="university")
    names = _unique_names(
        rng,
        n_universities,
        lambda g: f"{g.choice(_PLACES)} {g.choice(['University', 'College', 'Institute'])}",
    )
    for i, nm in enumerate(names):
        u = world.add(Entity(id=f"u{i}", type="university", name=nm))
        u.add("name", nm)
        u.add("type", "Public" if rng.random() < 0.6 else "Private")
        phone = f"({int(rng.integers(200, 999))}) {int(rng.integers(200, 999))}-{int(rng.integers(1000, 9999))}"
        u.add("phone", phone)
        slug = nm.lower().replace(" ", "")[:14]
        u.add("website", f"www.{slug}.edu")
    return world


_BUILDERS = {
    "movie": build_movie_world,
    "book": build_book_world,
    "nbaplayer": build_nba_world,
    "university": build_university_world,
}


def build_world(vertical: str, seed: int = 0, **kwargs) -> World:
    """Build the ground-truth world for a vertical (deterministic)."""
    return _BUILDERS[vertical](seed, **kwargs)


def world_to_kb(
    world: World,
    *,
    entity_coverage: float = 1.0,
    predicate_coverage: dict | None = None,
    entity_ids: list | None = None,
    seed: int = 0,
) -> KBData:
    """Subsample a world into a seed KB.

    ``entity_coverage`` keeps that fraction of entities as KB subjects
    (or pass ``entity_ids`` explicitly); ``predicate_coverage`` maps a
    predicate to the fraction of its triples kept (the paper's biased
    IMDb KB). Name-like predicates are always kept for covered entities
    so the KB can identify its own subjects.
    """
    rng = np.random.default_rng(seed)
    if entity_ids is None:
        ids = sorted(world.entities)
        keep = rng.random(len(ids)) < entity_coverage
        entity_ids = [i for i, k in zip(ids, keep) if k]
    chosen = set(entity_ids)
    pc = predicate_coverage or {}
    ent_rows, triple_rows = [], []
    for eid in sorted(chosen):
        e = world.entities[eid]
        ent_rows.append((e.id, e.type, e.name))
        for pred, objs in e.facts.items():
            p_keep = pc.get(pred, 1.0)
            for o in objs:
                if pred in NAME_PREDICATES or rng.random() < p_keep:
                    triple_rows.append((e.id, e.type, e.name, pred, o))
    return KBData(
        entities=pd.DataFrame(ent_rows, columns=["entity_id", "entity_type", "name"]),
        triples=pd.DataFrame(
            triple_rows,
            columns=["subject_id", "subject_type", "subject_name", "predicate", "object"],
        ),
    )


def kb_from_entities(world: World, entity_ids: list, seed: int = 0) -> KBData:
    """Seed KB containing exactly ``entity_ids`` with all their facts —
    the paper's "KB built from one site's ground truth" setup."""
    return world_to_kb(world, entity_ids=entity_ids, seed=seed)
