"""Evaluation metrics on hand-built extractions and gold."""
import pandas as pd
import pytest

from repro.eval.metrics import (
    annotation_metrics,
    extraction_metrics,
    page_hit_metrics,
    topic_metrics,
    vertical_f1,
)


def _gold():
    return pd.DataFrame(
        [
            ("v", "s1", "p1", "Film A", "title", "Film A"),
            ("v", "s1", "p1", "Film A", "directed_by", "Ann Lee"),
            ("v", "s1", "p1", "Film A", "genre", "Drama"),
            ("v", "s1", "p1", "Film A", "genre", "Comedy"),
            ("v", "s1", "p2", "Film B", "title", "Film B"),
            ("v", "s1", "p2", "Film B", "directed_by", "Bob Roy"),
        ],
        columns=["vertical", "site", "page_id", "subject", "predicate", "object"],
    )


def _ext(rows):
    return pd.DataFrame(
        rows,
        columns=["grp", "site", "page_id", "subject", "predicate", "object", "confidence"],
    )


class TestExtractionMetrics:
    def test_perfect(self):
        ext = _ext(
            [
                ("s1", "s1", "p1", "Film A", "_name", "Film A", 0.9),
                ("s1", "s1", "p1", "Film A", "directed_by", "Ann Lee", 0.9),
                ("s1", "s1", "p1", "Film A", "genre", "Drama", 0.9),
                ("s1", "s1", "p1", "Film A", "genre", "Comedy", 0.9),
                ("s1", "s1", "p2", "Film B", "_name", "Film B", 0.9),
                ("s1", "s1", "p2", "Film B", "directed_by", "Bob Roy", 0.9),
            ]
        )
        m = extraction_metrics(ext, _gold())
        assert (m["precision"] == 1.0).all()
        assert (m["recall"] == 1.0).all()

    def test_name_label_mapped_to_site_name_predicate(self):
        ext = _ext([("s1", "s1", "p1", "Film A", "_name", "Film A", 0.9)])
        m = extraction_metrics(ext, _gold())
        t = m[m["predicate"] == "title"].iloc[0]
        assert t["tp"] == 1

    def test_wrong_object_is_fp(self):
        ext = _ext([("s1", "s1", "p1", "Film A", "directed_by", "Wrong", 0.9)])
        m = extraction_metrics(ext, _gold())
        d = m[m["predicate"] == "directed_by"].iloc[0]
        assert d["fp"] == 1 and d["tp"] == 0 and d["fn"] == 2

    def test_wrong_subject_is_fp_when_required(self):
        ext = _ext([("s1", "s1", "p1", "Film X", "directed_by", "Ann Lee", 0.9)])
        m = extraction_metrics(ext, _gold())
        assert m[m["predicate"] == "directed_by"].iloc[0]["tp"] == 0
        m2 = extraction_metrics(ext, _gold(), require_subject=False)
        assert m2[m2["predicate"] == "directed_by"].iloc[0]["tp"] == 1

    def test_eval_pages_filter(self):
        ext = _ext([("s1", "s1", "p1", "Film A", "directed_by", "Ann Lee", 0.9)])
        m = extraction_metrics(ext, _gold(), eval_pages={"p2"})
        d = m[m["predicate"] == "directed_by"].iloc[0]
        assert d["tp"] == 0 and d["fn"] == 1  # only p2's gold counts

    def test_object_normalisation(self):
        ext = _ext([("s1", "s1", "p1", "Film A", "directed_by", "  ANN LEE. ", 0.9)])
        m = extraction_metrics(ext, _gold())
        assert m[m["predicate"] == "directed_by"].iloc[0]["tp"] == 1

    def test_empty_extractions(self):
        m = extraction_metrics(_ext([]), _gold())
        assert (m["tp"] == 0).all()
        assert m["fn"].sum() == len(_gold())


class TestPageHitMetrics:
    def test_top_confidence_wins(self):
        ext = _ext(
            [
                ("s1", "s1", "p1", "Film A", "directed_by", "Wrong", 0.6),
                ("s1", "s1", "p1", "Film A", "directed_by", "Ann Lee", 0.9),
            ]
        )
        m = page_hit_metrics(ext, _gold())
        d = m[m["predicate"] == "directed_by"].iloc[0]
        assert d["tp"] == 1 and d["fp"] == 0

    def test_miss_counts_once_per_page(self):
        m = page_hit_metrics(_ext([]), _gold())
        d = m[m["predicate"] == "directed_by"].iloc[0]
        assert d["fn"] == 2

    def test_any_gold_object_counts(self):
        ext = _ext([("s1", "s1", "p1", "Film A", "genre", "Comedy", 0.7)])
        m = page_hit_metrics(ext, _gold())
        assert m[m["predicate"] == "genre"].iloc[0]["tp"] == 1


class TestVerticalF1:
    def test_macro_over_sites(self):
        m = pd.DataFrame(
            [
                ("s1", "a", 1, 0, 0, 1.0, 1.0, 1.0),
                ("s2", "a", 0, 1, 1, 0.0, 0.0, 0.0),
            ],
            columns=["site", "predicate", "tp", "fp", "fn", "precision", "recall", "f1"],
        )
        assert vertical_f1(m) == pytest.approx(0.5)

    def test_empty(self):
        assert vertical_f1(pd.DataFrame(columns=["site", "tp", "fp", "fn"])) == 0.0


class TestAnnotationMetrics:
    def _fixture(self):
        gold_nodes = pd.DataFrame(
            [
                ("v", "s1", "p1", "/x[1]", "title", "Film A"),
                ("v", "s1", "p1", "/x[2]", "directed_by", "Ann Lee"),
                ("v", "s1", "p1", "/x[3]", "genre", "Drama"),
            ],
            columns=["vertical", "site", "page_id", "xpath", "predicate", "object"],
        )
        topics = pd.DataFrame(
            [("v", "s1", "p1", "f1", "Film A")],
            columns=["vertical", "site", "page_id", "entity_id", "topic"],
        )
        kb = pd.DataFrame(
            [
                ("f1", "film", "Film A", "directed_by", "Ann Lee"),
                ("f1", "film", "Film A", "genre", "Drama"),
            ],
            columns=["subject_id", "subject_type", "subject_name", "predicate", "object"],
        )
        return gold_nodes, topics, kb

    def test_perfect_annotation(self):
        gold_nodes, topics, kb = self._fixture()
        ann = pd.DataFrame(
            [
                ("s1", "p1", "/x[2]", "directed_by", "ann lee"),
                ("s1", "p1", "/x[3]", "genre", "drama"),
            ],
            columns=["grp", "page_id", "xpath", "label", "object_norm"],
        )
        m = annotation_metrics(ann, gold_nodes, topics, kb).set_index("predicate")
        assert m.loc["directed_by", "precision"] == 1.0
        assert m.loc["directed_by", "recall"] == 1.0

    def test_wrong_node_hurts_precision_and_recall(self):
        gold_nodes, topics, kb = self._fixture()
        ann = pd.DataFrame(
            [("s1", "p1", "/x[9]", "directed_by", "ann lee")],
            columns=["grp", "page_id", "xpath", "label", "object_norm"],
        )
        m = annotation_metrics(ann, gold_nodes, topics, kb).set_index("predicate")
        assert m.loc["directed_by", "precision"] == 0.0
        assert m.loc["directed_by", "recall"] == 0.0

    def test_fact_outside_kb_not_in_recall_denominator(self):
        gold_nodes, topics, kb = self._fixture()
        kb = kb[kb["predicate"] != "genre"]  # genre fact unknown to KB
        ann = pd.DataFrame(
            [("s1", "p1", "/x[3]", "genre", "drama")],
            columns=["grp", "page_id", "xpath", "label", "object_norm"],
        )
        m = annotation_metrics(ann, gold_nodes, topics, kb).set_index("predicate")
        assert m.loc["genre", "precision"] == 1.0
        assert m.loc["genre", "recall"] == 0.0  # nothing recallable


class TestTopicMetrics:
    def test_basic(self):
        topics = pd.DataFrame(
            [("p1", "film a"), ("p2", "wrong topic")],
            columns=["page_id", "topic_norm"],
        )
        gold = pd.DataFrame(
            [
                ("v", "s", "p1", "f1", "Film A"),
                ("v", "s", "p2", "f2", "Film B"),
                ("v", "s", "p3", "f3", "Film C"),
            ],
            columns=["vertical", "site", "page_id", "entity_id", "topic"],
        )
        kb_entities = pd.DataFrame(
            [("f1", "film", "Film A"), ("f2", "film", "Film B"), ("f3", "film", "Film C")],
            columns=["entity_id", "entity_type", "name"],
        )
        m = topic_metrics(topics, gold, kb_entities)
        row = m.iloc[0]
        assert row["precision"] == pytest.approx(0.5)
        assert row["recall"] == pytest.approx(1 / 3)

    def test_pages_not_in_kb_excluded_from_recall(self):
        topics = pd.DataFrame([("p1", "film a")], columns=["page_id", "topic_norm"])
        gold = pd.DataFrame(
            [("v", "s", "p1", "f1", "Film A"), ("v", "s", "p2", "f9", "Unknown")],
            columns=["vertical", "site", "page_id", "entity_id", "topic"],
        )
        kb_entities = pd.DataFrame(
            [("f1", "film", "Film A")], columns=["entity_id", "entity_type", "name"]
        )
        m = topic_metrics(topics, gold, kb_entities)
        assert m.iloc[0]["recall"] == 1.0
