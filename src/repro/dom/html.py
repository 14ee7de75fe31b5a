"""Serialise a :class:`DomNode` tree to HTML and parse it back.

The parser is built on the stdlib :class:`html.parser.HTMLParser` (no
external dependencies are available offline). The generator only emits
non-void elements with properly nested tags, so a strict stack parser is
sufficient; stray text at the top level and unknown entities are
tolerated. Direct text of an element is the concatenation of its text
chunks (stripped), matching how the generator assigns ``DomNode.text``.
"""
from __future__ import annotations

import html as _html
from html.parser import HTMLParser

from repro.dom.tree import DomNode


def render_html(root: DomNode) -> str:
    """Serialise a tree to an HTML string (text first, then children)."""
    parts: list[str] = []
    _render(root, parts)
    return "".join(parts)


def _render(node: DomNode, parts: list[str]) -> None:
    attrs = "".join(
        f' {k}="{_html.escape(str(v), quote=True)}"' for k, v in node.attrs.items()
    )
    parts.append(f"<{node.tag}{attrs}>")
    if node.text:
        parts.append(_html.escape(node.text))
    for child in node.children:
        _render(child, parts)
    parts.append(f"</{node.tag}>")


class _TreeBuilder(HTMLParser):
    def __init__(self) -> None:
        super().__init__(convert_charrefs=True)
        self.root: DomNode | None = None
        self._stack: list[DomNode] = []

    def handle_starttag(self, tag: str, attrs) -> None:
        node = DomNode(tag=tag, attrs={k: (v or "") for k, v in attrs})
        if self._stack:
            self._stack[-1].children.append(node)
        elif self.root is None:
            self.root = node
        self._stack.append(node)

    def handle_endtag(self, tag: str) -> None:
        # Pop to the matching open tag; tolerate stray close tags.
        for i in range(len(self._stack) - 1, -1, -1):
            if self._stack[i].tag == tag:
                del self._stack[i:]
                return

    def handle_data(self, data: str) -> None:
        if self._stack and data.strip():
            cur = self._stack[-1]
            cur.text = f"{cur.text} {data.strip()}".strip() if cur.text else data.strip()


def parse_html(source: str) -> DomNode:
    """Parse an HTML string into a :class:`DomNode` tree.

    Raises ``ValueError`` if no element is found.
    """
    builder = _TreeBuilder()
    builder.feed(source)
    builder.close()
    if builder.root is None:
        raise ValueError("no root element found in HTML source")
    return builder.root
