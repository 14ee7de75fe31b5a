"""DOM substrate: tree model, HTML render/parse, Spark bridging."""
from repro.dom.tree import DomNode, PageIndex, iter_with_xpath, text_fields

__all__ = ["DomNode", "PageIndex", "iter_with_xpath", "text_fields"]
