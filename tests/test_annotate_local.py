"""Pure-python pieces of Algorithm 2: best local mention, page groups."""
import pandas as pd

from repro.core.annotate import (
    _ancestor_prefixes,
    _annotate_page_group,
    best_local_mention,
)


class TestAncestorPrefixes:
    def test_nearest_first(self):
        assert _ancestor_prefixes("/a[1]/b[1]/c[1]") == ["/a[1]/b[1]", "/a[1]"]

    def test_root_has_none(self):
        assert _ancestor_prefixes("/a[1]") == []


class TestBestLocalMention:
    def test_single_mention_counts_whole_page(self):
        m = ["/h[1]/b[1]/d[1]/ul[1]/li[1]/a[1]"]
        preds = set(m) | {"/h[1]/b[1]/d[1]/ul[1]/li[2]/a[1]"}
        assert best_local_mention(m, preds) == m

    def test_prefers_mention_near_other_objects(self):
        # Object appears in the cast list and in a recommendation strip;
        # the cast list holds more objects of the predicate (Example 3.1).
        cast = [f"/h[1]/b[1]/d[1]/ul[1]/li[{i}]/a[1]" for i in (1, 2, 3)]
        rec = "/h[1]/b[1]/d[9]/span[1]"
        mentions = [cast[0], rec]
        preds = set(cast) | {rec}
        assert best_local_mention(mentions, preds) == [cast[0]]

    def test_tie_returns_both(self):
        a = "/h[1]/b[1]/d[1]/span[1]"
        b = "/h[1]/b[1]/d[2]/span[1]"
        assert sorted(best_local_mention([a, b], {a, b})) == [a, b]

    def test_ancestor_blocked_by_other_mention(self):
        # Two mentions under one div: each anchor stops below the common
        # ancestor, so counts stay local.
        a = "/h[1]/d[1]/s[1]"
        b = "/h[1]/d[1]/s[2]"
        extra = "/h[1]/d[1]/s[3]"
        best = best_local_mention([a, b], {a, b, extra})
        assert sorted(best) == [a, b]


class TestAnnotatePageGroup:
    def _pdf(self, rows):
        return pd.DataFrame(
            rows,
            columns=[
                "grp", "page_id", "predicate", "object_norm", "xpath",
                "cluster_size", "duplicated",
            ],
        )

    def test_unique_mention_annotated(self):
        pdf = self._pdf([("g", "p", "genre", "drama", "/a[1]/b[1]", 5, False)])
        out = _annotate_page_group(pdf)
        assert len(out) == 1 and out.iloc[0]["xpath"] == "/a[1]/b[1]"

    def test_one_annotation_per_object(self):
        pdf = self._pdf(
            [
                ("g", "p", "genre", "drama", "/a[1]/b[1]/c[1]", 9, False),
                ("g", "p", "genre", "drama", "/a[1]/z[1]/c[1]", 2, False),
            ]
        )
        out = _annotate_page_group(pdf)
        assert len(out) == 1

    def test_cluster_breaks_tie(self):
        # Both sections hold one genre object each (local tie); the
        # bigger cross-page cluster wins (Example 3.2).
        pdf = self._pdf(
            [
                ("g", "p", "genre", "drama", "/a[1]/top[1]/c[1]", 50, False),
                ("g", "p", "genre", "drama", "/a[1]/rec[1]/c[1]", 3, False),
            ]
        )
        out = _annotate_page_group(pdf)
        assert out.iloc[0]["xpath"] == "/a[1]/top[1]/c[1]"

    def test_duplicated_predicate_forces_cluster_choice(self):
        pdf = self._pdf(
            [
                ("g", "p", "genre", "drama", "/a[1]/top[1]/c[1]", 50, True),
                ("g", "p", "genre", "drama", "/a[1]/rec[1]/c[1]", 3, True),
            ]
        )
        out = _annotate_page_group(pdf)
        assert out.iloc[0]["xpath"] == "/a[1]/top[1]/c[1]"

    def test_multiple_objects_each_annotated(self):
        pdf = self._pdf(
            [
                ("g", "p", "genre", "drama", "/a[1]/ul[1]/li[1]", 5, False),
                ("g", "p", "genre", "comedy", "/a[1]/ul[1]/li[2]", 5, False),
                ("g", "p", "directed_by", "ann lee", "/a[1]/d[1]/s[1]", 4, False),
            ]
        )
        out = _annotate_page_group(pdf)
        assert len(out) == 3
        assert set(out["label"]) == {"genre", "directed_by"}
