"""Corpus builders: synthetic SWDE, IMDb, and CommonCrawl analogues.

Each builder returns a :class:`Corpus` bundling the world, the seed KB
(possibly a biased subsample), the rendered sites, and gold labels. Page
counts are parameters so tests run tiny corpora and benchmarks run
larger ones; the paper's absolute scale (400K+ pages) is out of reach of
a single local session and is documented in EXPERIMENTS.md.
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np
import pandas as pd

from repro.kb.generator import (
    Entity,
    KBData,
    World,
    build_world,
    kb_from_entities,
    world_to_kb,
)
from repro.webgen.templates import SiteData, SiteSpec, generate_site


@dataclass
class Corpus:
    """A set of rendered sites + the seed KB used to annotate them."""

    name: str
    world: World
    kb: KBData
    sites: list = field(default_factory=list)

    @property
    def pages(self) -> list:
        return [p for s in self.sites for p in s.pages]

    def gold_nodes(self) -> pd.DataFrame:
        return pd.concat([s.gold_nodes for s in self.sites], ignore_index=True)

    def topics(self) -> pd.DataFrame:
        return pd.concat([s.topics for s in self.sites], ignore_index=True)

    def gold_triples(self) -> pd.DataFrame:
        """Asserted triples per page: subject = the page's topic name."""
        gn = self.gold_nodes()
        topics = self.topics()[["page_id", "topic", "entity_id"]]
        out = gn.merge(topics, on="page_id", how="left")
        out = out[out["topic"].notna()]
        out = out.rename(columns={"topic": "subject"})
        return out[
            ["vertical", "site", "page_id", "subject", "predicate", "object"]
        ].drop_duplicates()


def _split_pool(world: World, entity_type: str, kb: KBData) -> tuple[list, list]:
    covered = set(kb.entities["entity_id"])
    pool = sorted(world.of_type(entity_type), key=lambda e: e.id)
    return (
        [e for e in pool if e.id in covered],
        [e for e in pool if e.id not in covered],
    )


def _sample_entities(
    rng: np.random.Generator,
    in_kb: list,
    out_kb: list,
    n: int,
    overlap: float,
) -> list:
    """Draw ``n`` site entities, ~``overlap`` fraction from the KB-covered pool."""
    n_in = min(len(in_kb), int(round(n * overlap)))
    n_out = min(len(out_kb), n - n_in)
    if n_in + n_out < n:  # pools exhausted; top up from whichever has spare
        n_in = min(len(in_kb), n - n_out)
    picked = []
    if n_in:
        picked += list(rng.choice(np.array(in_kb, dtype=object), size=n_in, replace=False))
    if n_out:
        picked += list(rng.choice(np.array(out_kb, dtype=object), size=n_out, replace=False))
    rng.shuffle(picked)
    return picked


# ----------------------------------------------------------------- SWDE

#: Predicates the SWDE ground truth scores (paper Table 1).
SWDE_PREDICATES = {
    "movie": ["title", "directed_by", "genre", "mpaa_rating"],
    "book": ["title", "author", "isbn13", "publisher", "publication_date"],
    "nbaplayer": ["name", "height", "team", "weight"],
    "university": ["name", "phone", "website", "type"],
}
#: Predicates the sites *display*. Movie pages additionally show cast
#: lists (as real SWDE movie sites do) — unscored, but they multiply
#: entity mentions per page, which is what blows up CERES-Baseline's
#: pairwise annotation (§5.3's OOM) while CERES stays linear.
#: Writers/music are displayed too (as real movie sites do): without a
#: writers section, written_by KB triples would annotate the *director*
#: node whenever writer == director (40% of films), diluting training —
#: the §3.2 proximity-overlap problem Algorithm 2 resolves via distinct
#: sections.
SWDE_DISPLAY_PREDICATES = {
    **SWDE_PREDICATES,
    "movie": [
        "title",
        "directed_by",
        "written_by",
        "genre",
        "mpaa_rating",
        "music_by",
        "has_cast_member",
    ],
}
SWDE_ENTITY_TYPE = {
    "movie": "film",
    "book": "book",
    "nbaplayer": "player",
    "university": "university",
}


def swde_corpus(
    vertical: str,
    *,
    n_sites: int = 4,
    pages_per_site: int = 30,
    seed: int = 0,
) -> Corpus:
    """Synthetic SWDE vertical (paper Table 1 setup).

    Movie uses a high-coverage IMDb-like KB that *lacks* mpaa_rating (the
    paper's footnote: no seed data for Movie.MPAA-Rating). The other
    verticals build the KB from the first site's ground truth, so
    inter-site entity overlap governs annotation counts — Book's world is
    large relative to the sites, reproducing its low overlap (Figure 4).
    """
    etype = SWDE_ENTITY_TYPE[vertical]
    # World size relative to a site's page count controls inter-site (and
    # hence site↔KB) overlap: NBA sites all cover the same players (97%
    # of pages annotated in the paper); Book sites barely overlap (11%).
    world_scale = {"movie": 2.2, "book": 6.0, "nbaplayer": 1.05, "university": 1.8}[vertical]
    n_entities = max(12, int(pages_per_site * world_scale))
    size_kw = {
        "movie": {"n_films": n_entities, "n_people": max(80, n_entities * 2)},
        "book": {"n_books": n_entities},
        "nbaplayer": {"n_players": n_entities},
        "university": {"n_universities": n_entities},
    }[vertical]
    world = build_world(vertical, seed=seed + 11, **size_kw)
    rng = np.random.default_rng(seed + 101)

    pool = sorted(world.of_type(etype), key=lambda e: e.id)
    site_entities = {}
    site_names = [f"{vertical}-site-{chr(ord('a') + i)}.example" for i in range(n_sites)]
    for i, name in enumerate(site_names):
        n = min(pages_per_site, len(pool))
        site_entities[name] = list(
            rng.choice(np.array(pool, dtype=object), size=n, replace=False)
        )

    if vertical == "movie":
        # No seed data for MPAA ratings (paper Table 3 footnote a); cast
        # facts are also absent so cast lists stay pure mention noise.
        kb = world_to_kb(
            world,
            entity_coverage=0.85,
            predicate_coverage={"mpaa_rating": 0.0, "has_cast_member": 0.0},
            seed=seed + 7,
        )
    else:
        # Paper: seed KB = ground truth of the alphabetically first site.
        kb = kb_from_entities(world, [e.id for e in site_entities[site_names[0]]], seed=seed + 7)

    sites = []
    for i, name in enumerate(site_names):
        spec = SiteSpec(
            name=name,
            vertical=vertical,
            entity_type=etype,
            predicates=list(SWDE_DISPLAY_PREDICATES[vertical]),
            seed=seed * 131 + i,
            n_pages=pages_per_site,
            # one University site shows the Public/Private facet box on
            # every page — the paper's §5.3 annotation-error case
            search_box_types=(vertical == "university" and i == n_sites - 1),
            label_lang="en" if i % 3 != 2 else f"lang{i}",
        )
        sites.append(generate_site(spec, world, site_entities[name]))
    return Corpus(name=f"swde-{vertical}", world=world, kb=kb, sites=sites)


# ----------------------------------------------------------------- IMDb

#: §5.4 footnote: fraction of each predicate's site facts present in KB.
IMDB_KB_BIAS = {
    "has_cast_member": 0.30,
    "acted_in": 0.30,
    "producer_of": 0.25,
    "director_of": 0.55,
    "writer_of": 0.45,
    "genre": 0.75,
    "created_music_for": 0.30,
}

IMDB_FILM_PREDICATES = [
    "title",
    "directed_by",
    "written_by",
    "has_cast_member",
    "genre",
    "release_date",
    "release_year",
    "episode_number",
    "season_number",
    "series",
]
IMDB_PERSON_PREDICATES = [
    "name",
    "alias",
    "place_of_birth",
    "acted_in",
    "director_of",
    "writer_of",
    "producer_of",
]


def imdb_corpus(
    *,
    n_film_pages: int = 40,
    n_person_pages: int = 24,
    n_episode_pages: int = 12,
    seed: int = 0,
) -> Corpus:
    """IMDb-like site: Film/TV and Person templates sharing one world.

    The KB is a biased subsample (IMDB_KB_BIAS) of site truth, so many
    facts on pages are absent from the KB — the long-tail condition the
    paper highlights. Person pages carry the "Known For" and alias-echo
    sections that break CERES-Topic (Table 5).
    """
    world = build_world(
        "movie",
        seed=seed + 3,
        n_films=max(60, n_film_pages * 2),
        n_people=max(140, n_person_pages * 5),
        n_series=8,
        n_episodes=max(24, n_episode_pages * 2),
    )
    kb = world_to_kb(
        world, entity_coverage=0.85, predicate_coverage=IMDB_KB_BIAS, seed=seed + 9
    )
    rng = np.random.default_rng(seed + 31)
    films_in, films_out = _split_pool(world, "film", kb)
    people_in, people_out = _split_pool(world, "person", kb)
    eps_in, eps_out = _split_pool(world, "tv_episode", kb)

    film_entities = _sample_entities(rng, films_in, films_out, n_film_pages, 0.8)
    ep_entities = _sample_entities(rng, eps_in, eps_out, n_episode_pages, 0.8)
    person_entities = _sample_entities(rng, people_in, people_out, n_person_pages, 0.8)

    film_spec = SiteSpec(
        name="imdb-like.example",
        vertical="movie",
        entity_type="film",
        predicates=list(IMDB_FILM_PREDICATES),
        seed=seed * 17 + 1,
        n_pages=n_film_pages + n_episode_pages,
        recommend_prob=0.7,
        template_id="film",
        max_list=14,
    )
    person_spec = SiteSpec(
        name="imdb-like.example",
        vertical="movie",
        entity_type="person",
        predicates=list(IMDB_PERSON_PREDICATES),
        seed=seed * 17 + 2,
        n_pages=n_person_pages,
        known_for=True,
        appearances=True,
        recommend_prob=0.4,
        template_id="person",
        max_list=14,
    )
    film_site = generate_site(film_spec, world, film_entities + ep_entities)
    person_site = generate_site(person_spec, world, person_entities)
    return Corpus(
        name="imdb", world=world, kb=kb, sites=[film_site, person_site]
    )


# ----------------------------------------------------------- CommonCrawl

#: (site, focus, relative size, KB overlap, label lang, quirk kwargs).
#: Quirks mirror the §5.5.1 failure taxonomy; precision should degrade
#: roughly down this list, as in Table 8.
CCRAWL_SITES = [
    ("themoviedb.example", "General film information", 3.0, 0.75, "en", {}),
    ("blaxploitation.example", "Blaxploitation films", 0.6, 0.8, "en", {}),
    ("danskefilm.example", "Danish films", 1.0, 0.55, "da", {}),
    ("filmitalia.example", "Italian films", 1.0, 0.6, "it", {}),
    ("kmdb.example", "Korean films", 0.8, 0.15, "ko", {}),
    ("rottentomatoes.example", "Film reviews", 3.0, 0.7, "en", {"non_detail_frac": 0.15}),
    ("moviecrow.example", "Indian films", 0.6, 0.25, "en", {}),
    ("nfb.example", "Canadian films", 1.6, 0.4, "en", {}),
    ("kinobox.example", "Czech films", 1.6, 0.35, "cz", {}),
    ("samdb.example", "South African films", 0.6, 0.1, "en", {}),
    ("dianying.example", "Chinese films", 1.2, 0.3, "zh", {"shift_section_prob": 0.5}),
    ("myanimelist.example", "Animated films", 1.2, 0.35, "en", {"max_list": 16, "shift_section_prob": 0.5}),
    ("hkmdb.example", "Hong Kong films", 1.0, 0.35, "en", {"max_list": 16, "reorder_prob": 0.2}),
    ("bollywoodmdb.example", "Bollywood films", 0.8, 0.4, "hi", {"reorder_prob": 0.45}),
    ("soundtrackcollector.example", "Movie soundtracks", 0.8, 0.5, "en", {"reorder_prob": 0.35, "shift_section_prob": 0.6}),
    ("spicyonion.example", "Indian films", 0.8, 0.5, "en", {"merge_roles": True}),
    ("filmindonesia.example", "Indonesian films", 0.8, 0.45, "id", {"merge_roles": True}),
    ("the-numbers.example", "Financial performance", 2.0, 0.6, "en", {"date_lists": True, "non_detail_frac": 0.2}),
    ("christianfilmdatabase.example", "Christian films", 0.8, 0.5, "en", {"all_genres_everywhere": True}),
    ("laborfilms.example", "Labor movement films", 0.6, 0.45, "en", {"all_genres_everywhere": True, "reorder_prob": 0.3}),
    ("colonialfilm.example", "Colonial-era films", 0.6, 0.12, "en", {"reorder_prob": 0.7}),
    ("sfd-sfu.example", "Slovak films", 0.6, 0.1, "sk", {"reorder_prob": 0.7}),
    ("bcdb.example", "Animated films", 0.5, 0.03, "en", {}),
    ("boxofficemojo.example", "Financial performance", 2.0, 0.6, "en", {"non_detail_frac": 1.0}),
]

CCRAWL_FILM_PREDICATES = [
    "title",
    "directed_by",
    "written_by",
    "has_cast_member",
    "genre",
    "release_date",
    "release_year",
    "music_by",
]
CCRAWL_PERSON_PREDICATES = [
    "name",
    "place_of_birth",
    "acted_in",
    "director_of",
    "writer_of",
    "created_music_for",
]

_PERSON_SITES = {"spicyonion.example", "filmindonesia.example", "soundtrackcollector.example"}


def commoncrawl_corpus(
    *,
    pages_base: int = 24,
    seed: int = 0,
    sites: list | None = None,
) -> Corpus:
    """Long-tail multi-site movie corpus (Table 8 setup).

    One shared movie world; the seed KB covers ~40% of entities with the
    IMDb predicate bias, so long-tail sites mostly show unknown entities
    — giving extraction:annotation ratios well above 1 (Table 8).
    """
    max_rel = max(rel for _, _, rel, *_ in CCRAWL_SITES)
    n_pool = int(pages_base * max_rel * 3)
    world = build_world(
        "movie",
        seed=seed + 5,
        n_films=max(80, n_pool),
        n_people=max(160, n_pool * 2),
        n_series=8,
        n_episodes=40,
    )
    kb = world_to_kb(
        world, entity_coverage=0.45, predicate_coverage=IMDB_KB_BIAS, seed=seed + 13
    )
    films_in, films_out = _split_pool(world, "film", kb)
    people_in, people_out = _split_pool(world, "person", kb)

    out_sites = []
    for i, (name, focus, rel, overlap, lang, quirks) in enumerate(
        sites if sites is not None else CCRAWL_SITES
    ):
        rng = np.random.default_rng(seed * 7 + 1000 + i)
        n_pages = max(4, int(round(pages_base * rel)))
        person_site = name in _PERSON_SITES
        etype = "person" if person_site else "film"
        preds = list(CCRAWL_PERSON_PREDICATES if person_site else CCRAWL_FILM_PREDICATES)
        if name == "soundtrackcollector.example":
            preds = ["name", "place_of_birth", "created_music_for"]
        pool_in, pool_out = (people_in, people_out) if person_site else (films_in, films_out)
        entities = _sample_entities(rng, pool_in, pool_out, n_pages, overlap)
        spec = SiteSpec(
            name=name,
            vertical="movie",
            entity_type=etype,
            predicates=preds,
            seed=seed * 31 + 500 + i,
            n_pages=n_pages,
            label_lang=lang,
            **quirks,
        )
        data = generate_site(spec, world, entities)
        data.focus = focus
        out_sites.append(data)
    return Corpus(name="commoncrawl", world=world, kb=kb, sites=out_sites)
