"""Spark stages of the pipeline: nodes, matching, topic, annotate, model.

Aggregation results are cross-checked against DuckDB via the oracle
where the computation is expressible as SQL over the same inputs.
"""
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.core.annotate import NAME_LABEL, annotate, candidate_mentions
from repro.core.features import featurize_pages, frequent_strings
from repro.core.matching import kb_to_spark, page_mentions, stop_objects
from repro.core.model import NodeClassifier
from repro.core.negatives import OTHER_LABEL, sample_negatives
from repro.core.topic import TopicConfig, identify_topics, score_topic_candidates
from repro.dom.dataframe import nodes_df, pages_to_df
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def prepared(spark, nba_corpus):
    pages_df = pages_to_df(spark, nba_corpus.pages).withColumn(
        "grp", F.col("site")
    ).cache()
    nodes = (
        nodes_df(pages_df.drop("grp"))
        .join(pages_df.select("page_id", "grp"), on="page_id")
        .select("grp", "vertical", "site", "page_id", "xpath", "text")
        .localCheckpoint()
    )
    kb_df = kb_to_spark(spark, nba_corpus.kb).cache()
    return pages_df, nodes, kb_df


class TestNodesDf:
    def test_one_row_per_text_field(self, spark, prepared, nba_corpus):
        from repro.dom.html import parse_html
        from repro.dom.tree import text_fields

        _, nodes, _ = prepared
        expected = sum(
            len(text_fields(parse_html(p["html"]))) for p in nba_corpus.pages
        )
        assert nodes.count() == expected

    def test_oracle_page_counts(self, spark, prepared):
        _, nodes, _ = prepared
        got = nodes.groupBy("page_id").agg(F.count("*").alias("n"))
        assert_equivalent(
            got,
            "SELECT page_id, count(*) AS n FROM nodes GROUP BY page_id",
            nodes=nodes,
        )

    def test_schema(self, prepared):
        _, nodes, _ = prepared
        assert set(nodes.columns) == {"grp", "vertical", "site", "page_id", "xpath", "text"}


class TestMatching:
    def test_mentions_match_kb_strings(self, prepared):
        _, nodes, kb_df = prepared
        m = page_mentions(nodes, kb_df)
        kb_strings = {
            r["norm"]
            for r in kb_df.selectExpr("subject_norm AS norm")
            .union(kb_df.selectExpr("object_norm AS norm"))
            .distinct()
            .collect()
        }
        assert {r["norm"] for r in m.select("norm").distinct().collect()} <= kb_strings

    def test_mentions_nonempty(self, prepared):
        _, nodes, kb_df = prepared
        assert page_mentions(nodes, kb_df).count() > 0

    def test_stop_objects_threshold(self, spark, prepared):
        _, _, kb_df = prepared
        stops = stop_objects(kb_df, frac=0.0, min_count=2)
        counts = kb_df.groupBy("object_norm").agg(F.count("*").alias("n")).toPandas()
        expected = set(counts[counts["n"] >= 2]["object_norm"])
        assert {r["norm"] for r in stops.collect()} == expected


class TestTopic:
    def test_scores_bounded(self, prepared):
        _, nodes, kb_df = prepared
        sc = score_topic_candidates(nodes, kb_df, TopicConfig()).toPandas()
        assert ((sc["score"] > 0) & (sc["score"] <= 1)).all()

    def test_topics_identified_for_most_kb_pages(self, prepared, nba_corpus):
        _, nodes, kb_df = prepared
        topics = identify_topics(nodes, kb_df).toPandas()
        gold = nba_corpus.topics()
        kb_names = set(nba_corpus.kb.entities["name"])
        in_kb = gold[gold["topic"].isin(kb_names)]
        assert len(topics) >= 0.6 * len(in_kb)

    def test_topics_are_correct(self, prepared, nba_corpus):
        from repro.core.matching import norm_text

        _, nodes, kb_df = prepared
        topics = identify_topics(nodes, kb_df).toPandas()
        gold = dict(
            zip(nba_corpus.topics()["page_id"], nba_corpus.topics()["topic"].map(norm_text))
        )
        correct = sum(
            1 for r in topics.itertuples() if gold.get(r.page_id) == r.topic_norm
        )
        assert correct / len(topics) > 0.9

    def test_uniqueness_filter(self, spark, prepared):
        _, nodes, kb_df = prepared
        # A draconian limit of 1 page per candidate wipes out shared topics.
        t1 = identify_topics(nodes, kb_df, TopicConfig(max_topic_pages=1)).toPandas()
        tn = identify_topics(nodes, kb_df, TopicConfig()).toPandas()
        assert len(t1) <= len(tn)


class TestAnnotate:
    @pytest.fixture(scope="class")
    def topics(self, prepared):
        _, nodes, kb_df = prepared
        return identify_topics(nodes, kb_df).localCheckpoint()

    def test_full_annotations_on_gold_nodes(self, prepared, topics, nba_corpus):
        _, nodes, kb_df = prepared
        ann = annotate(nodes, topics, kb_df, mode="full").toPandas()
        gold = nba_corpus.gold_nodes()
        gold_keys = set(zip(gold["page_id"], gold["xpath"], gold["predicate"]))
        rel = ann[ann["label"] != NAME_LABEL]
        correct = sum(
            1
            for r in rel.itertuples()
            if (r.page_id, r.xpath, r.label) in gold_keys
        )
        assert correct / len(rel) > 0.9

    def test_at_most_one_mention_per_object(self, prepared, topics):
        _, nodes, kb_df = prepared
        ann = annotate(nodes, topics, kb_df, mode="full").toPandas()
        rel = ann[ann["label"] != NAME_LABEL]
        dup = rel.groupby(["grp", "page_id", "label", "object_norm"]).size()
        assert (dup == 1).all()

    def test_topic_mode_superset(self, prepared, topics):
        _, nodes, kb_df = prepared
        full = annotate(nodes, topics, kb_df, mode="full").count()
        topic = annotate(nodes, topics, kb_df, mode="topic").count()
        assert topic >= full

    def test_informativeness_filter(self, prepared, topics):
        from repro.core.annotate import AnnotateConfig

        _, nodes, kb_df = prepared
        strict = annotate(
            nodes, topics, kb_df, AnnotateConfig(min_annotations=99)
        ).count()
        assert strict == 0

    def test_candidates_exclude_name_predicates(self, prepared, topics):
        _, nodes, kb_df = prepared
        cands = candidate_mentions(nodes, topics, kb_df).toPandas()
        assert not set(cands["predicate"]) & {"name", "title"}

    def test_unknown_mode_raises(self, prepared, topics):
        _, nodes, kb_df = prepared
        with pytest.raises(ValueError):
            annotate(nodes, topics, kb_df, mode="bogus")


class TestNegatives:
    def test_ratio_and_no_overlap(self, spark, prepared):
        _, nodes, kb_df = prepared
        topics = identify_topics(nodes, kb_df).localCheckpoint()
        ann = annotate(nodes, topics, kb_df).localCheckpoint()
        neg = sample_negatives(nodes, ann, r=3).toPandas()
        ann_pdf = ann.toPandas()
        assert (neg["label"] == OTHER_LABEL).all()
        pos_keys = set(zip(ann_pdf["page_id"], ann_pdf["xpath"]))
        assert not any((r.page_id, r.xpath) in pos_keys for r in neg.itertuples())
        per_page_pos = ann_pdf.groupby("page_id").size()
        per_page_neg = neg.groupby("page_id").size()
        for pid, n in per_page_neg.items():
            assert n <= 3 * per_page_pos[pid]


class TestFeaturesSpark:
    def test_frequent_strings_finds_labels(self, prepared):
        _, nodes, _ = prepared
        freq = frequent_strings(nodes, min_frac=0.3)
        assert freq
        some_site = next(iter(freq.values()))
        assert any("Height" in s for s in some_site)

    def test_featurize_covers_all_text_nodes(self, prepared):
        pages_df, nodes, _ = prepared
        feats = featurize_pages(pages_df, {})
        assert feats.count() == nodes.count()

    def test_feature_arrays_nonempty(self, prepared):
        pages_df, _, _ = prepared
        feats = featurize_pages(pages_df, {}).limit(20).toPandas()
        assert all(len(f) > 0 for f in feats["features"])


class TestModel:
    def test_learns_separable_labels(self, spark):
        rows = []
        for i in range(40):
            label = "a" if i % 2 == 0 else "b"
            feats = [1, 2, 3] if label == "a" else [10, 11, 12]
            rows.append(("g", "s", f"p{i}", f"/x[{i}]", "t", feats, label))
        df = spark.createDataFrame(
            pd.DataFrame(
                rows,
                columns=["grp", "site", "page_id", "xpath", "text", "features", "label"],
            )
        )
        clf = NodeClassifier(labels=["a", "b"], max_iter=30).fit(df)
        scored = clf.predict(df).toPandas()
        for rec in scored.itertuples():
            probs = list(rec.probs)
            got = clf.labels[max(range(len(probs)), key=lambda i: probs[i])]
            want = "a" if int(rec.page_id[1:]) % 2 == 0 else "b"
            assert got == want
