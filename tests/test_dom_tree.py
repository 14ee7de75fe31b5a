"""DOM tree substrate: XPaths, ancestors, siblings, token helpers."""
import pytest
from hypothesis import given, settings, strategies as st

from repro.dom.tree import (
    DomNode,
    PageIndex,
    is_ancestor,
    iter_with_xpath,
    strip_indices,
    text_fields,
    xpath_tokens,
)


def sample_tree():
    root = DomNode("html")
    body = root.add(DomNode("body"))
    d1 = body.add(DomNode("div", {"class": "a"}))
    d1.add(DomNode("span", text="one"))
    d1.add(DomNode("span", text="two"))
    d2 = body.add(DomNode("div", {"class": "b"}))
    ul = d2.add(DomNode("ul"))
    for t in ("x", "y", "z"):
        ul.add(DomNode("li", text=t))
    return root


class TestIterWithXpath:
    def test_root_path(self):
        root = sample_tree()
        node, path = next(iter_with_xpath(root))
        assert node is root and path == "/html[1]"

    def test_document_order(self):
        paths = [p for _, p in iter_with_xpath(sample_tree())]
        assert paths.index("/html[1]/body[1]") < paths.index(
            "/html[1]/body[1]/div[1]"
        )
        assert paths.index("/html[1]/body[1]/div[1]/span[2]") < paths.index(
            "/html[1]/body[1]/div[2]"
        )

    def test_same_tag_siblings_indexed(self):
        paths = [p for _, p in iter_with_xpath(sample_tree())]
        assert "/html[1]/body[1]/div[1]" in paths
        assert "/html[1]/body[1]/div[2]" in paths

    def test_mixed_tag_indexing_restarts_per_tag(self):
        root = DomNode("r")
        root.add(DomNode("a"))
        root.add(DomNode("b"))
        root.add(DomNode("a"))
        paths = [p for _, p in iter_with_xpath(root)]
        assert paths == ["/r[1]", "/r[1]/a[1]", "/r[1]/b[1]", "/r[1]/a[2]"]

    def test_all_nodes_visited(self):
        assert len(list(iter_with_xpath(sample_tree()))) == 10


class TestTextFields:
    def test_only_nonempty_text(self):
        fields = text_fields(sample_tree())
        assert len(fields) == 5
        assert ("/html[1]/body[1]/div[1]/span[1]", "one") in fields

    def test_whitespace_text_skipped(self):
        root = DomNode("r", text="   ")
        assert text_fields(root) == []

    def test_text_stripped(self):
        root = DomNode("r", text="  hi  ")
        assert text_fields(root) == [("/r[1]", "hi")]


class TestXpathTokens:
    def test_roundtrip_tokens(self):
        assert xpath_tokens("/a[1]/b[2]/c[13]") == [("a", 1), ("b", 2), ("c", 13)]

    def test_strip_indices(self):
        assert strip_indices("/a[1]/b[2]") == "/a/b"

    def test_missing_index_defaults_to_one(self):
        assert xpath_tokens("/a/b[2]") == [("a", 1), ("b", 2)]


class TestIsAncestor:
    @pytest.mark.parametrize(
        "prefix,path,expected",
        [
            ("/a[1]", "/a[1]/b[1]", True),
            ("/a[1]", "/a[1]", True),
            ("/a[1]/b[1]", "/a[1]", False),
            ("/a[1]", "/a[11]/b[1]", False),  # prefix must end on a step
            ("/a[1]/b[1]", "/a[1]/b[2]", False),
        ],
    )
    def test_cases(self, prefix, path, expected):
        assert is_ancestor(prefix, path) is expected


class TestPageIndex:
    def test_contains_and_node(self):
        idx = PageIndex(sample_tree())
        assert "/html[1]/body[1]/div[2]/ul[1]/li[3]" in idx
        assert idx.node("/html[1]/body[1]/div[2]/ul[1]/li[3]").text == "z"

    def test_parent(self):
        idx = PageIndex(sample_tree())
        assert idx.parent("/html[1]/body[1]/div[1]") == "/html[1]/body[1]"
        assert idx.parent("/html[1]") is None

    def test_ancestors_nearest_first(self):
        idx = PageIndex(sample_tree())
        assert idx.ancestors("/html[1]/body[1]/div[2]/ul[1]/li[1]") == [
            "/html[1]/body[1]/div[2]/ul[1]",
            "/html[1]/body[1]/div[2]",
            "/html[1]/body[1]",
            "/html[1]",
        ]

    def test_siblings_within_width(self):
        idx = PageIndex(sample_tree())
        sibs = idx.siblings("/html[1]/body[1]/div[2]/ul[1]/li[2]", 5)
        assert (-1, "/html[1]/body[1]/div[2]/ul[1]/li[1]") in sibs
        assert (1, "/html[1]/body[1]/div[2]/ul[1]/li[3]") in sibs

    def test_siblings_respects_width(self):
        idx = PageIndex(sample_tree())
        sibs = idx.siblings("/html[1]/body[1]/div[2]/ul[1]/li[1]", 1)
        assert [off for off, _ in sibs] == [1]

    def test_siblings_cross_tag(self):
        # Sibling offsets are positional among *all* siblings, not same-tag.
        root = DomNode("r")
        root.add(DomNode("a", text="1"))
        root.add(DomNode("b", text="2"))
        idx = PageIndex(root)
        assert idx.siblings("/r[1]/a[1]", 2) == [(1, "/r[1]/b[1]")]

    def test_text_fields_matches_module_fn(self):
        root = sample_tree()
        assert sorted(PageIndex(root).text_fields()) == sorted(text_fields(root))

    def test_subtree_xpaths(self):
        idx = PageIndex(sample_tree())
        sub = idx.subtree_xpaths("/html[1]/body[1]/div[2]")
        assert len(sub) == 5  # div, ul, 3 li

    def test_children(self):
        idx = PageIndex(sample_tree())
        assert idx.children("/html[1]/body[1]/div[2]/ul[1]") == [
            f"/html[1]/body[1]/div[2]/ul[1]/li[{i}]" for i in (1, 2, 3)
        ]


class TestFindAll:
    def test_find_all(self):
        assert len(sample_tree().find_all("li")) == 3
        assert len(sample_tree().find_all("html")) == 1


@settings(max_examples=30, deadline=None)
@given(
    st.lists(
        st.sampled_from(["div", "span", "ul", "li"]), min_size=1, max_size=6
    )
)
def test_pageindex_consistent_with_iterator(tags):
    """PageIndex and iter_with_xpath must assign identical XPaths."""
    root = DomNode("html")
    cur = root
    for t in tags:
        cur = cur.add(DomNode(t, text=t))
    from_iter = {p for _, p in iter_with_xpath(root)}
    assert set(PageIndex(root).xpaths) == from_iter
