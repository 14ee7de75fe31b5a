"""Numbers reported in the paper, recorded for EXPERIMENTS.md diffing.

Only our four implementations re-run; prior-art rows of Table 3 are
constants (those systems are not re-implemented — paper §5.2 likewise
copies their numbers from the literature).
"""

#: Table 1 — SWDE verticals used (sites, pages, attributes).
TABLE1 = {
    "movie": {"sites": 10, "pages": 20000, "attributes": ["title", "director", "genre", "rating"]},
    "book": {"sites": 10, "pages": 20000, "attributes": ["title", "author", "ISBN-13", "publisher", "publication_date"]},
    "nbaplayer": {"sites": 10, "pages": 4405, "attributes": ["name", "height", "team", "weight"]},
    "university": {"sites": 10, "pages": 16705, "attributes": ["name", "phone", "website", "type"]},
}

#: Table 2 — IMDb-derived seed KB (85M triples total).
TABLE2 = {
    "person": {"instances": 7_670_000, "predicates": 15},
    "film": {"instances": 430_000, "predicates": 19},
    "tv_series": {"instances": 120_000, "predicates": 9},
    "tv_episode": {"instances": 1_090_000, "predicates": 18},
}

#: Table 3 — SWDE page-hit F1 per vertical.
TABLE3 = {
    "Hao et al.": {"manual": True, "movie": 0.79, "nbaplayer": 0.82, "university": 0.83, "book": 0.86},
    "XTPath": {"manual": True, "movie": 0.94, "nbaplayer": 0.98, "university": 0.98, "book": 0.97},
    "BigGrams": {"manual": True, "movie": 0.74, "nbaplayer": 0.90, "university": 0.79, "book": 0.78},
    "LODIE-Ideal": {"manual": False, "movie": 0.86, "nbaplayer": 0.90, "university": 0.96, "book": 0.85},
    "LODIE-LOD": {"manual": False, "movie": 0.76, "nbaplayer": 0.87, "university": 0.91, "book": 0.78},
    "RR+WADaR": {"manual": False, "movie": 0.73, "nbaplayer": 0.80, "university": 0.79, "book": 0.70},
    "RR+WADaR 2": {"manual": False, "movie": 0.75, "nbaplayer": 0.91, "university": 0.79, "book": 0.71},
    "Bronzi et al.": {"manual": False, "movie": 0.93, "nbaplayer": 0.89, "university": 0.97, "book": 0.91},
    "Vertex++": {"manual": True, "movie": 0.90, "nbaplayer": 0.97, "university": 1.00, "book": 0.94},
    "CERES-Baseline": {"manual": False, "movie": None, "nbaplayer": 0.78, "university": 0.72, "book": 0.27},
    "CERES-Topic": {"manual": False, "movie": 0.99, "nbaplayer": 0.97, "university": 0.96, "book": 0.72},
    "CERES-Full": {"manual": False, "movie": 0.99, "nbaplayer": 0.98, "university": 0.94, "book": 0.76},
}

#: Table 4 — SWDE all-mentions P/R/F1: (vertex P,R,F1, ceres P,R,F1).
TABLE4 = {
    ("movie", "title"): (1.00, 1.00, 1.00, 1.00, 1.00, 1.00),
    ("movie", "directed_by"): (0.99, 0.99, 0.99, 0.99, 0.99, 0.99),
    ("movie", "genre"): (0.88, 0.87, 0.87, 0.93, 0.97, 0.95),
    ("movie", "mpaa_rating"): (1.00, 1.00, 1.00, None, None, None),
    ("nbaplayer", "name"): (0.99, 0.99, 0.99, 1.00, 1.00, 1.00),
    ("nbaplayer", "team"): (1.00, 1.00, 1.00, 0.91, 1.00, 0.95),
    ("nbaplayer", "weight"): (1.00, 1.00, 1.00, 1.00, 1.00, 1.00),
    ("nbaplayer", "height"): (1.00, 1.00, 1.00, 1.00, 0.90, 0.95),
    ("university", "name"): (1.00, 1.00, 1.00, 1.00, 1.00, 1.00),
    ("university", "type"): (1.00, 1.00, 1.00, 0.72, 0.80, 0.76),
    ("university", "phone"): (0.97, 0.92, 0.94, 0.85, 0.95, 0.90),
    ("university", "website"): (1.00, 1.00, 1.00, 0.90, 1.00, 0.95),
    ("book", "title"): (0.99, 0.99, 0.99, 1.00, 0.90, 0.95),
    ("book", "author"): (0.97, 0.96, 0.96, 0.72, 0.88, 0.79),
    ("book", "publisher"): (0.85, 0.85, 0.85, 0.97, 0.77, 0.86),
    ("book", "publication_date"): (0.90, 0.90, 0.90, 1.00, 0.40, 0.57),
    ("book", "isbn13"): (0.94, 0.94, 0.94, 0.99, 0.19, 0.32),
}

#: Table 5 — IMDb extraction quality: (topic P,R,F1, full P,R,F1).
TABLE5 = {
    ("Person", "_name"): (1.0, 1.0, 1.0, 1.0, 1.0, 1.0),
    ("Person", "alias"): (0.06, 1.0, 0.11, 0.98, 1.0, 0.99),
    ("Person", "place_of_birth"): (0.96, 0.87, 0.91, 1.0, 0.93, 0.96),
    ("Person", "acted_in"): (0.41, 0.64, 0.50, 0.93, 0.65, 0.77),
    ("Person", "director_of"): (0.48, 0.92, 0.63, 0.95, 0.95, 0.95),
    ("Person", "writer_of"): (0.32, 0.56, 0.41, 0.89, 0.69, 0.78),
    ("Person", "producer_of"): (0.48, 0.24, 0.32, 0.80, 0.44, 0.57),
    ("Person", "ALL"): (0.36, 0.65, 0.46, 0.93, 0.68, 0.79),
    ("Film/TV", "_name"): (1.0, 1.0, 1.0, 1.0, 1.0, 1.0),
    ("Film/TV", "has_cast_member"): (0.93, 0.46, 0.62, 1.0, 0.49, 0.66),
    ("Film/TV", "directed_by"): (0.80, 0.99, 0.88, 0.93, 0.98, 0.95),
    ("Film/TV", "written_by"): (0.99, 0.67, 0.80, 0.99, 0.89, 0.94),
    ("Film/TV", "release_date"): (0.37, 0.14, 0.20, 1.0, 0.63, 0.77),
    ("Film/TV", "release_year"): (0.74, 0.96, 0.84, 0.91, 1.0, 0.95),
    ("Film/TV", "genre"): (0.80, 1.0, 0.89, 1.0, 0.99, 0.99),
    ("Film/TV", "episode_number"): (1.0, 1.0, 1.0, 1.0, 1.0, 1.0),
    ("Film/TV", "season_number"): (0.98, 1.0, 0.99, 0.87, 1.0, 0.93),
    ("Film/TV", "series"): (0.50, 0.01, 0.02, 1.0, 1.0, 1.0),
    ("Film/TV", "ALL"): (0.88, 0.59, 0.70, 0.99, 0.65, 0.78),
}

#: Table 6 — IMDb annotation accuracy: (topic P,R,F1, full P,R,F1).
TABLE6 = {
    ("Person", "alias"): (0.19, 1.00, 0.33, 1.00, 0.71, 0.83),
    ("Person", "place_of_birth"): (0.84, 0.55, 0.67, 0.90, 0.45, 0.60),
    ("Person", "acted_in"): (0.63, 0.99, 0.77, 0.98, 0.83, 0.90),
    ("Person", "director_of"): (0.26, 0.99, 0.41, 0.88, 0.36, 0.51),
    ("Person", "writer_of"): (0.33, 0.99, 0.50, 0.77, 0.81, 0.79),
    ("Person", "producer_of"): (0.45, 0.98, 0.61, 0.55, 0.91, 0.68),
    ("Person", "ALL"): (0.46, 0.99, 0.60, 0.93, 0.78, 0.83),
    ("Film/TV", "has_cast_member"): (0.83, 0.88, 0.86, 0.99, 0.80, 0.89),
    ("Film/TV", "directed_by"): (0.47, 0.74, 0.58, 0.88, 0.71, 0.79),
    ("Film/TV", "written_by"): (0.68, 0.52, 0.59, 0.90, 0.36, 0.51),
    ("Film/TV", "release_date"): (0.53, 0.59, 0.56, 1.0, 0.56, 0.72),
    ("Film/TV", "release_year"): (0.27, 0.75, 0.39, 1.0, 0.71, 0.83),
    ("Film/TV", "genre"): (0.55, 0.82, 0.66, 0.96, 0.82, 0.88),
    ("Film/TV", "episode_number"): (0.45, 0.25, 0.32, 1.0, 0.20, 0.33),
    ("Film/TV", "season_number"): (0.89, 0.40, 0.55, 0.88, 0.35, 0.50),
    ("Film/TV", "series"): (0.44, 0.42, 0.43, 1.0, 0.42, 0.59),
    ("Film/TV", "ALL"): (0.53, 0.80, 0.61, 0.96, 0.71, 0.83),
}

#: Table 7 — IMDb topic identification accuracy.
TABLE7 = {
    "Person": {"precision": 0.99, "recall": 0.76, "f1": 0.86},
    "Film/TV": {"precision": 0.97, "recall": 0.88, "f1": 0.92},
}

#: Table 8 — CommonCrawl per-site precision @ 0.5 (site → precision;
#: None = no extractions). Subset keyed by our synthetic analogues.
TABLE8_PRECISION = {
    "themoviedb.example": 1.00,
    "blaxploitation.example": 1.00,
    "danskefilm.example": 0.98,
    "filmitalia.example": 0.96,
    "kmdb.example": 0.95,
    "rottentomatoes.example": 0.91,
    "moviecrow.example": 0.91,
    "nfb.example": 0.91,
    "kinobox.example": 0.90,
    "samdb.example": 0.88,
    "dianying.example": 0.84,
    "myanimelist.example": 0.80,
    "hkmdb.example": 0.75,
    "bollywoodmdb.example": 0.72,
    "soundtrackcollector.example": 0.70,
    "spicyonion.example": 0.70,
    "filmindonesia.example": 0.67,
    "the-numbers.example": 0.65,
    "christianfilmdatabase.example": 0.59,
    "laborfilms.example": 0.45,
    "colonialfilm.example": 0.29,
    "sfd-sfu.example": 0.21,
    "bcdb.example": None,
    "boxofficemojo.example": None,
}
TABLE8_TOTALS = {
    "pages": 433_832,
    "annotated_pages": 70_050,
    "annotations": 414_074,
    "extractions": 1_688_913,
    "extraction_to_annotation": 4.08,
    "precision": 0.83,
}

#: Table 9 — top-10 predicates (paper name → ours), precision @ 0.5.
TABLE9 = {
    "has_cast_member": {"annotations": 78_527, "extractions": 441_368, "precision": 0.98},
    "acted_in": {"annotations": 86_273, "extractions": 379_848, "precision": 0.96},
    "genre": {"annotations": 40_359, "extractions": 175_092, "precision": 0.90},
    "release_date": {"annotations": 25_213, "extractions": 132_891, "precision": 0.41},
    "directed_by": {"annotations": 25_159, "extractions": 85_244, "precision": 0.94},
    "director_of": {"annotations": 14_893, "extractions": 67_408, "precision": 0.72},
    "created_music_for": {"annotations": 7_065, "extractions": 61_351, "precision": 0.25},
    "alias": {"annotations": 4_654, "extractions": 59_051, "precision": 0.99},
    "written_by": {"annotations": 18_643, "extractions": 58_645, "precision": 0.93},
    "writer_of": {"annotations": 8_665, "extractions": 36_871, "precision": 0.52},
}
