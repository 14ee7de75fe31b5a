"""Site templates: render world entities into detail-page DOM trees.

Each :class:`SiteSpec` fixes a website's layout style (tags, class
names, label vocabulary, section order) via its seed, then each page
adds per-page variation: missing fields, varying list lengths, optional
sections that shift sibling indices (the paper's Figure 2 phenomenon),
recommendation blocks carrying *another* entity's facts, and the §5.5.1
quirk classes (all-genres-on-every-page, role-less filmographies,
per-page section reordering, non-detail chart pages).

The renderer records gold labels as it goes: for every value node, the
``(xpath, predicate, object)`` it asserts about the topic entity, plus
the topic node itself under the ontology's name predicate.
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np
import pandas as pd

from repro.dom.html import render_html
from repro.dom.tree import DomNode, iter_with_xpath
from repro.kb.generator import GENRES, Entity, World

#: English label vocabulary; non-English sites derive pseudo-words.
LABELS_EN = {
    "title": "Title",
    "name": "Name",
    "directed_by": "Director",
    "written_by": "Writers",
    "has_cast_member": "Cast",
    "genre": "Genres",
    "release_date": "Release Date",
    "release_year": "Year",
    "mpaa_rating": "MPAA Rating",
    "music_by": "Music",
    "alias": "Also Known As",
    "place_of_birth": "Born In",
    "acted_in": "Actor",
    "director_of": "Director",
    "writer_of": "Writer",
    "producer_of": "Producer",
    "created_music_for": "Composer",
    "episode_number": "Episode",
    "season_number": "Season",
    "series": "Series",
    "author": "Author",
    "isbn13": "ISBN-13",
    "publisher": "Publisher",
    "publication_date": "Publication Date",
    "team": "Team",
    "height": "Height",
    "weight": "Weight",
    "type": "Type",
    "phone": "Phone",
    "website": "Website",
    "filmography": "Filmography",
}

_NAV = ["Home", "Search", "Help", "About", "Contact"]
_FOOTER = ["Terms of Use", "Privacy Policy", "Sitemap"]
_SYLL = ["ka", "ri", "to", "ve", "mu", "la", "so", "di", "ne", "pa", "zu", "fi"]


@dataclass
class SiteSpec:
    """Layout + noise parameters for one synthetic website template."""

    name: str
    vertical: str
    entity_type: str
    predicates: list  # predicates this template displays, base order
    seed: int = 0
    n_pages: int = 40
    label_lang: str = "en"  # "en" or anything else -> pseudo-word labels
    missing_prob: float = 0.08
    shift_section_prob: float = 0.25
    recommend_prob: float = 0.5
    known_for: bool = False
    appearances: bool = False  # alias-echo credits section (IMDb person)
    all_genres_everywhere: bool = False
    merge_roles: bool = False
    search_box_types: bool = False
    date_lists: bool = False  # release date buried in a long date chart
    non_detail_frac: float = 0.0
    reorder_prob: float = 0.0
    max_list: int = 12
    value_noise: float = 0.04
    template_id: str = "main"  # distinguishes co-hosted templates (IMDb)


@dataclass
class SiteData:
    """All pages of one site plus gold labels."""

    spec: SiteSpec
    pages: list = field(default_factory=list)  # dicts for pages_to_df
    gold_nodes: pd.DataFrame = None  # page_id, xpath, predicate, object
    topics: pd.DataFrame = None  # page_id, entity_id, topic (None topic = non-detail)


class _Style:
    """Per-site deterministic layout choices."""

    def __init__(self, spec: SiteSpec):
        rng = np.random.default_rng(spec.seed * 7919 + 17)
        self.row_tag = str(rng.choice(["div", "p", "tr"]))
        self.label_tag = str(rng.choice(["span", "b", "td", "strong"]))
        self.value_tag = str(rng.choice(["span", "a", "td"]))
        self.section_tag = str(rng.choice(["div", "section"]))
        self.title_tag = str(rng.choice(["h1", "h1", "h2"]))
        self.label_suffix = str(rng.choice([":", "", " :"]))
        self.cls = {
            k: f"{k[:3]}-{rng.integers(10, 99)}"
            for k in ("info", "row", "label", "value", "section", "list", "title")
        }
        order = list(spec.predicates)
        rng.shuffle(order)
        self.pred_order = order
        if spec.label_lang == "en":
            self.labels = dict(LABELS_EN)
        else:
            lang_rng = np.random.default_rng(abs(hash(spec.label_lang)) % (2**31))
            self.labels = {
                k: "".join(lang_rng.choice(_SYLL, size=3)).capitalize()
                for k in LABELS_EN
            }
        self.multi_threshold = 1  # preds with >1 value render as lists


def _noise(text: str, rng: np.random.Generator, p: float) -> str:
    """Light surface noise the matcher's normalisation must absorb."""
    if rng.random() >= p:
        return text
    k = rng.integers(0, 3)
    if k == 0:
        return text.upper()
    if k == 1:
        return f" {text} "
    return f"{text}."


def _row(style: _Style, label: str, cls_key: str = "row") -> tuple[DomNode, DomNode]:
    """A label/value row; returns (row, value_node)."""
    row = DomNode(style.row_tag, {"class": style.cls[cls_key]})
    row.add(DomNode(style.label_tag, {"class": style.cls["label"]}, text=label + style.label_suffix))
    value = row.add(DomNode(style.value_tag, {"class": style.cls["value"]}))
    return row, value


def _list_section(
    style: _Style, label: str, values: list, *, itemprop: str = ""
) -> tuple[DomNode, list]:
    sec = DomNode(style.section_tag, {"class": style.cls["section"]})
    sec.add(DomNode("h2", {"class": style.cls["label"]}, text=label))
    ul = sec.add(DomNode("ul", {"class": style.cls["list"]}))
    nodes = []
    for v in values:
        li = ul.add(DomNode("li", {}))
        attrs = {"itemprop": itemprop} if itemprop else {}
        nodes.append(li.add(DomNode("a", attrs, text=v)))
    return sec, nodes


def build_detail_page(
    spec: SiteSpec, style: _Style, entity: Entity, world: World, rng: np.random.Generator
) -> tuple[DomNode, list]:
    """Render one detail page; returns (root, gold list of (node, pred, obj))."""
    gold: list[tuple[DomNode, str, str]] = []
    root = DomNode("html", {})
    root.add(DomNode("head", {})).add(
        DomNode("title", {}, text=f"{spec.name} - {entity.name}")
    )
    body = root.add(DomNode("body", {}))

    header = body.add(DomNode("div", {"class": "header"}))
    header.add(DomNode("span", {"class": "logo"}, text=spec.name))
    nav = header.add(DomNode("ul", {"class": "nav"}))
    for item in _NAV:
        nav.add(DomNode("li", {}, text=item))
    if spec.search_box_types:
        box = body.add(DomNode("div", {"class": "searchbox"}))
        box.add(DomNode("span", {}, text="Search by type"))
        for t in ("Public", "Private"):
            box.add(DomNode("span", {"class": "facet"}, text=t))

    main = body.add(DomNode("div", {"class": "main"}))
    name_pred = "title" if "title" in entity.facts else "name"
    title_node = main.add(
        DomNode(style.title_tag, {"class": style.cls["title"]}, text=entity.name)
    )
    gold.append((title_node, name_pred, entity.name))

    order = list(style.pred_order)
    if rng.random() < spec.reorder_prob:
        rng.shuffle(order)

    # Optional decoy section *before* the facts: shifts sibling indices
    # of everything below it (paper Figure 2).
    if rng.random() < spec.shift_section_prob:
        extra = main.add(DomNode(style.section_tag, {"class": "awards"}))
        extra.add(DomNode("h2", {}, text="Awards"))
        extra.add(
            DomNode("p", {}, text=f"Nominated for {int(rng.integers(1, 9))} awards")
        )

    info = main.add(DomNode(style.section_tag, {"class": style.cls["info"]}))
    role_preds = {"acted_in", "director_of", "writer_of", "producer_of"}
    merged: list[tuple[str, str]] = []
    for pred in order:
        if pred == name_pred:
            continue
        values = entity.facts.get(pred, [])
        if spec.merge_roles and pred in role_preds:
            merged.extend((pred, v) for v in values)
            continue
        if spec.date_lists and pred == "release_date" and values:
            decoys = [
                f"{int(rng.integers(1990, 2018)):04d}-{int(rng.integers(1, 13)):02d}-{int(rng.integers(1, 29)):02d}"
                for _ in range(6)
            ]
            shown = [values[0]] + decoys
            sec, nodes = _list_section(style, style.labels[pred], shown)
            main.add(sec)
            gold.append((nodes[0], pred, values[0]))  # decoy dates are not gold
            continue
        if spec.all_genres_everywhere and pred == "genre":
            shown = list(GENRES)  # superset list — only true genres are gold
            sec, nodes = _list_section(style, style.labels[pred], shown)
            main.add(sec)
            true = set(values)
            for node in nodes:
                if node.text in true:
                    gold.append((node, pred, node.text))
            continue
        if not values or rng.random() < spec.missing_prob:
            continue
        if len(values) > style.multi_threshold or pred in (
            "has_cast_member",
            "genre",
            "acted_in",
            "director_of",
            "writer_of",
            "producer_of",
            "created_music_for",
            "author",
        ):
            shown = values[: spec.max_list]
            disp = [_noise(v, rng, spec.value_noise) for v in shown]
            sec, nodes = _list_section(style, style.labels[pred], disp, itemprop=pred)
            main.add(sec)
            for node, v in zip(nodes, shown):
                gold.append((node, pred, v))
        else:
            row, vnode = _row(style, style.labels[pred])
            vnode.text = _noise(values[0], rng, spec.value_noise)
            info.add(row)
            gold.append((vnode, pred, values[0]))

    if merged:
        rng.shuffle(merged)
        shown = merged[: spec.max_list * 2]
        sec, nodes = _list_section(style, style.labels["filmography"], [v for _, v in shown])
        main.add(sec)
        for node, (pred, v) in zip(nodes, shown):
            gold.append((node, pred, v))  # role is asserted only implicitly

    if spec.known_for:
        films = (entity.facts.get("acted_in", []) + entity.facts.get("director_of", []))[:4]
        if films:
            sec, _ = _list_section(style, "Known For", films)
            main.add(sec)  # no gold: section has no predicate (paper §5.4)
    if spec.appearances and entity.facts.get("alias"):
        alias = entity.facts["alias"][0]
        sec, _ = _list_section(style, "Appearances", [alias] * 2 + [entity.name])
        main.add(sec)  # credits echo the alias; not an alias assertion

    if rng.random() < spec.recommend_prob:
        peers = [
            e
            for e in world.of_type(spec.entity_type)
            if e.id != entity.id
        ]
        if peers:
            rec = body.add(DomNode("div", {"class": "also-like"}))
            rec.add(DomNode("h2", {}, text="People who liked this also liked"))
            for peer in rng.choice(np.array(peers, dtype=object), size=min(2, len(peers)), replace=False):
                card = rec.add(DomNode("div", {"class": "rec-card"}))
                card.add(DomNode("a", {}, text=peer.name))
                for g in peer.facts.get("genre", [])[:2]:
                    card.add(DomNode("span", {"class": "rec-genre"}, text=g))

    footer = body.add(DomNode("div", {"class": "footer"}))
    for item in _FOOTER:
        footer.add(DomNode("span", {}, text=item))
    footer.add(DomNode("span", {}, text=f"(c) {spec.name}"))
    return root, gold


def build_chart_page(
    spec: SiteSpec, style: _Style, world: World, rng: np.random.Generator
) -> DomNode:
    """Non-detail page: a chart of entity names + figures, no topic."""
    root = DomNode("html", {})
    root.add(DomNode("head", {})).add(DomNode("title", {}, text=f"{spec.name} - Charts"))
    body = root.add(DomNode("body", {}))
    body.add(DomNode("h1", {}, text="Daily Chart"))
    table = body.add(DomNode("table", {"class": "chart"}))
    ents = world.of_type(spec.entity_type)
    for i in range(12):
        row = table.add(DomNode("tr", {}))
        ent = ents[int(rng.integers(0, len(ents)))]
        row.add(DomNode("td", {}, text=str(i + 1)))
        row.add(DomNode("td", {}, text=ent.name))
        row.add(DomNode("td", {}, text=f"${int(rng.integers(1000, 999999)):,}"))
    return root


def generate_site(spec: SiteSpec, world: World, entities: list) -> SiteData:
    """Render ``entities`` into detail pages (plus any non-detail pages)."""
    style = _Style(spec)
    pages, gold_rows, topic_rows = [], [], []
    n_detail = len(entities)
    n_chart = int(round(spec.non_detail_frac * n_detail / max(1e-9, 1 - spec.non_detail_frac))) if spec.non_detail_frac < 1 else spec.n_pages
    if spec.non_detail_frac >= 1:
        n_detail = 0
    for i in range(n_detail):
        entity = entities[i]
        rng = np.random.default_rng(spec.seed * 1_000_003 + i)
        root, gold = build_detail_page(spec, style, entity, world, rng)
        page_id = f"{spec.name}/{spec.template_id}/{i:05d}"
        pages.append(
            {
                "vertical": spec.vertical,
                "site": spec.name,
                "page_id": page_id,
                "html": render_html(root),
            }
        )
        node_to_path = {id(n): p for n, p in iter_with_xpath(root)}
        for node, pred, obj in gold:
            gold_rows.append(
                {
                    "vertical": spec.vertical,
                    "site": spec.name,
                    "page_id": page_id,
                    "xpath": node_to_path[id(node)],
                    "predicate": pred,
                    "object": obj,
                }
            )
        topic_rows.append(
            {
                "vertical": spec.vertical,
                "site": spec.name,
                "page_id": page_id,
                "entity_id": entity.id,
                "topic": entity.name,
            }
        )
    for j in range(n_chart):
        rng = np.random.default_rng(spec.seed * 2_000_003 + j)
        root = build_chart_page(spec, style, world, rng)
        page_id = f"{spec.name}/chart/{j:05d}"
        pages.append(
            {
                "vertical": spec.vertical,
                "site": spec.name,
                "page_id": page_id,
                "html": render_html(root),
            }
        )
        topic_rows.append(
            {
                "vertical": spec.vertical,
                "site": spec.name,
                "page_id": page_id,
                "entity_id": None,
                "topic": None,
            }
        )
    return SiteData(
        spec=spec,
        pages=pages,
        gold_nodes=pd.DataFrame(
            gold_rows,
            columns=["vertical", "site", "page_id", "xpath", "predicate", "object"],
        ),
        topics=pd.DataFrame(
            topic_rows, columns=["vertical", "site", "page_id", "entity_id", "topic"]
        ),
    )
