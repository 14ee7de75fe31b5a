"""Ontologies for the verticals the paper evaluates on (§5.1).

An :class:`Ontology` names the entity types and, per type, the
predicates (with multi-valued flags). Objects are strings throughout —
the paper leaves entity linkage of extractions to existing work (§2.1).
"""
from __future__ import annotations

from dataclasses import dataclass, field


@dataclass(frozen=True)
class Ontology:
    """Predicate vocabulary for one vertical."""

    name: str
    #: entity type -> ordered list of predicates
    predicates: dict = field(default_factory=dict)
    #: predicates that may hold several objects for one subject
    multi_valued: frozenset = frozenset()

    def all_predicates(self) -> list[str]:
        out: list[str] = []
        for preds in self.predicates.values():
            for p in preds:
                if p not in out:
                    out.append(p)
        return out


#: The Movie/IMDb ontology covers both the SWDE Movie vertical and the
#: IMDb experiment (Person + Film/TV domains, §5.4) and CommonCrawl.
MOVIE = Ontology(
    name="movie",
    predicates={
        "film": [
            "title",
            "directed_by",
            "written_by",
            "has_cast_member",
            "genre",
            "release_date",
            "release_year",
            "mpaa_rating",
            "music_by",
        ],
        "person": [
            "name",
            "alias",
            "place_of_birth",
            "acted_in",
            "director_of",
            "writer_of",
            "producer_of",
            "created_music_for",
        ],
        "tv_series": ["title", "genre", "has_cast_member"],
        "tv_episode": [
            "title",
            "episode_number",
            "season_number",
            "series",
            "has_cast_member",
            "directed_by",
            "release_year",
        ],
    },
    multi_valued=frozenset(
        {
            "directed_by",
            "written_by",
            "has_cast_member",
            "genre",
            "acted_in",
            "director_of",
            "writer_of",
            "producer_of",
            "created_music_for",
            "alias",
            "music_by",
        }
    ),
)

BOOK = Ontology(
    name="book",
    predicates={
        "book": ["title", "author", "isbn13", "publisher", "publication_date"]
    },
    multi_valued=frozenset({"author"}),
)

NBAPLAYER = Ontology(
    name="nbaplayer",
    predicates={"player": ["name", "team", "height", "weight"]},
    multi_valued=frozenset(),
)

UNIVERSITY = Ontology(
    name="university",
    predicates={"university": ["name", "type", "phone", "website"]},
    multi_valued=frozenset(),
)

ONTOLOGIES: dict[str, Ontology] = {
    o.name: o for o in (MOVIE, BOOK, NBAPLAYER, UNIVERSITY)
}

#: Name-like predicates: the node holding one of these is the page's
#: "name"/topic node (paper §4: topic node expresses the *name* relation).
NAME_PREDICATES = frozenset({"title", "name"})
