"""Lightweight DOM tree with absolute XPaths.

A :class:`DomNode` is an element with a tag, attributes, optional direct
text, and children. Absolute XPaths are 1-indexed per same-tag sibling
position, e.g. ``/html[1]/body[1]/div[2]/span[1]`` — the representation
the paper uses throughout (§2.1, Figure 2).

:class:`PageIndex` precomputes, for every node, its XPath, parent,
sibling position, ancestors and ancestor-siblings — the neighbourhood
the Vertex-style structural features (§4.2) need.
"""
from __future__ import annotations

from dataclasses import dataclass, field
from typing import Iterator, Optional

#: HTML attributes the classifier features look at (paper §4.2).
FEATURE_ATTRS = ("class", "id", "itemprop", "itemtype", "property")


@dataclass
class DomNode:
    """One element of a DOM tree."""

    tag: str
    attrs: dict = field(default_factory=dict)
    text: str = ""
    children: list = field(default_factory=list)

    def add(self, child: "DomNode") -> "DomNode":
        """Append ``child`` and return it (builder convenience)."""
        self.children.append(child)
        return child

    def find_all(self, tag: str) -> list["DomNode"]:
        """All descendants (and self) with the given tag, document order."""
        out = []
        for node, _ in iter_with_xpath(self):
            if node.tag == tag:
                out.append(node)
        return out


def iter_with_xpath(root: DomNode) -> Iterator[tuple[DomNode, str]]:
    """Yield ``(node, absolute_xpath)`` in document order."""
    stack: list[tuple[DomNode, str]] = [(root, f"/{root.tag}[1]")]
    while stack:
        node, path = stack.pop()
        yield node, path
        counts: dict[str, int] = {}
        enriched = []
        for child in node.children:
            counts[child.tag] = counts.get(child.tag, 0) + 1
            enriched.append((child, f"{path}/{child.tag}[{counts[child.tag]}]"))
        stack.extend(reversed(enriched))


def text_fields(root: DomNode) -> list[tuple[str, str]]:
    """``(xpath, text)`` for every node with non-empty direct text."""
    return [
        (path, node.text.strip())
        for node, path in iter_with_xpath(root)
        if node.text and node.text.strip()
    ]


def xpath_tokens(xpath: str) -> list[tuple[str, int]]:
    """Split ``/a[1]/b[2]`` into ``[("a", 1), ("b", 2)]``."""
    out = []
    for step in xpath.strip("/").split("/"):
        tag, _, idx = step.partition("[")
        out.append((tag, int(idx.rstrip("]")) if idx else 1))
    return out


def strip_indices(xpath: str) -> str:
    """Generalised path: ``/a[1]/b[2]`` → ``/a/b`` (template shingle)."""
    return "/" + "/".join(t for t, _ in xpath_tokens(xpath))


def is_ancestor(prefix: str, xpath: str) -> bool:
    """True if ``prefix`` is ``xpath`` itself or a proper XPath ancestor."""
    return xpath == prefix or xpath.startswith(prefix + "/")


@dataclass
class _Entry:
    node: DomNode
    xpath: str
    parent: Optional[str]  # parent xpath
    sibling_pos: int  # 0-based position among *all* siblings


class PageIndex:
    """Random-access structural index over one page's DOM tree."""

    def __init__(self, root: DomNode):
        self.root = root
        self._by_path: dict[str, _Entry] = {}
        self._children: dict[str, list[str]] = {}
        self._walk(root, f"/{root.tag}[1]", None, 0)

    def _walk(self, node: DomNode, path: str, parent: Optional[str], pos: int) -> None:
        self._by_path[path] = _Entry(node, path, parent, pos)
        self._children[path] = []
        if parent is not None:
            self._children[parent].append(path)
        counts: dict[str, int] = {}
        for i, child in enumerate(node.children):
            counts[child.tag] = counts.get(child.tag, 0) + 1
            self._walk(child, f"{path}/{child.tag}[{counts[child.tag]}]", path, i)

    def __contains__(self, xpath: str) -> bool:
        return xpath in self._by_path

    @property
    def xpaths(self) -> list[str]:
        return list(self._by_path)

    def node(self, xpath: str) -> DomNode:
        return self._by_path[xpath].node

    def parent(self, xpath: str) -> Optional[str]:
        return self._by_path[xpath].parent

    def children(self, xpath: str) -> list[str]:
        return self._children[xpath]

    def ancestors(self, xpath: str) -> list[str]:
        """Ancestor xpaths, nearest first, excluding ``xpath`` itself."""
        out = []
        cur = self.parent(xpath)
        while cur is not None:
            out.append(cur)
            cur = self.parent(cur)
        return out

    def siblings(self, xpath: str, width: int) -> list[tuple[int, str]]:
        """``(offset, sibling_xpath)`` within ±``width``, offset != 0."""
        parent = self.parent(xpath)
        if parent is None:
            return []
        sibs = self._children[parent]
        pos = self._by_path[xpath].sibling_pos
        out = []
        for off in range(-width, width + 1):
            if off == 0:
                continue
            j = pos + off
            if 0 <= j < len(sibs):
                out.append((off, sibs[j]))
        return out

    def text_fields(self) -> list[tuple[str, str]]:
        return [
            (e.xpath, e.node.text.strip())
            for e in self._by_path.values()
            if e.node.text and e.node.text.strip()
        ]

    def subtree_xpaths(self, prefix: str) -> list[str]:
        return [p for p in self._by_path if is_ancestor(prefix, p)]
