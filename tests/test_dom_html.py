"""HTML render/parse round-trips."""
import pytest
from hypothesis import given, settings, strategies as st

from repro.dom.html import parse_html, render_html
from repro.dom.tree import DomNode, iter_with_xpath, text_fields


def _tree_equal(a: DomNode, b: DomNode) -> bool:
    if (a.tag, a.attrs, a.text.strip() if a.text else "") != (
        b.tag,
        b.attrs,
        b.text.strip() if b.text else "",
    ):
        return False
    if len(a.children) != len(b.children):
        return False
    return all(_tree_equal(x, y) for x, y in zip(a.children, b.children))


class TestRender:
    def test_simple(self):
        assert render_html(DomNode("p", text="hi")) == "<p>hi</p>"

    def test_attrs(self):
        html = render_html(DomNode("div", {"class": "x", "id": "y"}))
        assert html == '<div class="x" id="y"></div>'

    def test_escaping(self):
        html = render_html(DomNode("p", text="a < b & c"))
        assert "a &lt; b &amp; c" in html

    def test_attr_escaping(self):
        html = render_html(DomNode("p", {"title": 'a"b'}))
        assert 'title="a&quot;b"' in html

    def test_nested(self):
        root = DomNode("div")
        root.add(DomNode("span", text="x"))
        assert render_html(root) == "<div><span>x</span></div>"


class TestParse:
    def test_roundtrip_simple(self):
        root = DomNode("html")
        body = root.add(DomNode("body"))
        body.add(DomNode("p", {"class": "c"}, text="hello world"))
        assert _tree_equal(parse_html(render_html(root)), root)

    def test_entities_decoded(self):
        root = parse_html("<p>a &lt; b</p>")
        assert root.text == "a < b"

    def test_empty_raises(self):
        with pytest.raises(ValueError):
            parse_html("   ")

    def test_stray_close_tag_tolerated(self):
        root = parse_html("<div><p>x</p></span></div>")
        assert root.tag == "div" and root.children[0].text == "x"

    def test_multiple_text_chunks_concatenated(self):
        root = parse_html("<p>a<b>inner</b>c</p>")
        assert root.text == "a c"
        assert root.children[0].text == "inner"

    def test_attrs_preserved(self):
        root = parse_html('<div class="x" itemprop="genre">t</div>')
        assert root.attrs == {"class": "x", "itemprop": "genre"}

    def test_xpaths_survive_roundtrip(self):
        root = DomNode("html")
        body = root.add(DomNode("body"))
        for i in range(3):
            d = body.add(DomNode("div"))
            d.add(DomNode("span", text=f"t{i}"))
        reparsed = parse_html(render_html(root))
        assert [p for _, p in iter_with_xpath(reparsed)] == [
            p for _, p in iter_with_xpath(root)
        ]


_TAGS = st.sampled_from(["div", "span", "p", "ul", "li", "a", "h1"])
_TEXT = st.text(
    alphabet=st.characters(whitelist_categories=("L", "N"), max_codepoint=0x24F),
    min_size=1,
    max_size=10,
).map(str.strip).filter(bool)


@st.composite
def trees(draw, depth=0):
    node = DomNode(draw(_TAGS))
    if draw(st.booleans()):
        node.text = draw(_TEXT)
    if depth < 2:
        for _ in range(draw(st.integers(0, 3))):
            node.children.append(draw(trees(depth=depth + 1)))
    return node


@settings(max_examples=40, deadline=None)
@given(trees())
def test_roundtrip_property(tree):
    """Text fields (the pipeline's view of a page) survive the round trip."""
    reparsed = parse_html(render_html(tree))
    assert text_fields(reparsed) == text_fields(tree)
