"""Featurisation and negative sampling (pure-python parts)."""
import pytest

from repro.core.features import hash_feature, node_features, HASH_DIM
from repro.dom.tree import DomNode, PageIndex


@pytest.fixture()
def page():
    root = DomNode("html")
    body = root.add(DomNode("body"))
    info = body.add(DomNode("div", {"class": "info"}))
    row = info.add(DomNode("div", {"class": "row"}))
    row.add(DomNode("span", {"class": "label"}, text="Director:"))
    row.add(DomNode("span", {"class": "value", "itemprop": "directed_by"}, text="Ann Lee"))
    sec = body.add(DomNode("div", {"class": "section"}))
    sec.add(DomNode("h2", text="Genres"))
    ul = sec.add(DomNode("ul"))
    for g in ("Drama", "Comedy"):
        ul.add(DomNode("li")).add(DomNode("a", text=g))
    return PageIndex(root)


VALUE = "/html[1]/body[1]/div[1]/div[1]/span[2]"
GENRE = "/html[1]/body[1]/div[2]/ul[1]/li[1]/a[1]"


class TestNodeFeatures:
    def test_own_tag_and_attrs(self, page):
        feats = node_features(page, VALUE, set())
        assert "s|tag|span|0|0" in feats
        assert "s|class|value|0|0" in feats
        assert "s|itemprop|directed_by|0|0" in feats

    def test_sibling_attrs(self, page):
        feats = node_features(page, VALUE, set())
        assert "s|class|label|0|-1" in feats

    def test_ancestor_attrs(self, page):
        feats = node_features(page, VALUE, set())
        assert "s|class|row|1|0" in feats
        assert "s|class|info|2|0" in feats

    def test_text_feature_for_adjacent_label(self, page):
        feats = node_features(page, VALUE, frequent={"Director:"})
        assert any(f.startswith("t|Director:") for f in feats)

    def test_text_feature_for_list_heading(self, page):
        feats = node_features(page, GENRE, frequent={"Genres"})
        assert any(f.startswith("t|Genres") for f in feats)

    def test_no_text_features_without_frequent_set(self, page):
        feats = node_features(page, VALUE, frequent=set())
        assert not any(f.startswith("t|") for f in feats)

    def test_different_sections_get_different_features(self, page):
        a = set(node_features(page, VALUE, set()))
        b = set(node_features(page, GENRE, set()))
        assert a != b


class TestHashFeature:
    def test_stable(self):
        assert hash_feature("s|tag|div|0|0") == hash_feature("s|tag|div|0|0")

    def test_in_range(self):
        for f in ("a", "b", "c", "s|tag|div|1|2"):
            assert 0 <= hash_feature(f) < HASH_DIM

    def test_dim_respected(self):
        assert 0 <= hash_feature("anything", dim=16) < 16
