"""String matching, stop objects, and XPath clustering."""
import pytest
from hypothesis import given, settings, strategies as st

from repro.core.cluster import cluster_xpaths, levenshtein
from repro.core.matching import is_low_info, norm_text
from repro.core.negatives import list_patterns, matches_pattern


class TestNormText:
    @pytest.mark.parametrize(
        "raw,expected",
        [
            ("Spike Lee", "spike lee"),
            ("  Spike   Lee  ", "spike lee"),
            ("Spike Lee.", "spike lee"),
            ("SPIKE LEE", "spike lee"),
            ('"Quoted"', "quoted"),
            ("ﬁlm", "film"),  # NFKC ligature fold
            ("", ""),
            (None, ""),
        ],
    )
    def test_cases(self, raw, expected):
        assert norm_text(raw) == expected

    def test_internal_punct_kept(self):
        assert norm_text("PG-13") == "pg-13"

    def test_idempotent(self):
        s = norm_text(" A  B. ")
        assert norm_text(s) == s


class TestLowInfo:
    @pytest.mark.parametrize("s,expected", [
        ("ab", True),
        ("1999", True),
        ("7", True),
        ("12345", False),
        ("drama", False),
        ("spike lee", False),
    ])
    def test_cases(self, s, expected):
        assert is_low_info(s) is expected


class TestLevenshtein:
    @pytest.mark.parametrize("a,b,d", [
        ((), (), 0),
        (("a",), (), 1),
        (("a", "b"), ("a", "b"), 0),
        (("a", "b"), ("a", "c"), 1),
        (("a", "b", "c"), ("a", "c"), 1),
        (("x", "y"), ("a", "b", "c"), 3),
    ])
    def test_cases(self, a, b, d):
        assert levenshtein(a, b) == d

    @settings(max_examples=50, deadline=None)
    @given(
        st.lists(st.sampled_from("abc"), max_size=6).map(tuple),
        st.lists(st.sampled_from("abc"), max_size=6).map(tuple),
    )
    def test_symmetry_and_bounds(self, a, b):
        d = levenshtein(a, b)
        assert d == levenshtein(b, a)
        assert abs(len(a) - len(b)) <= d <= max(len(a), len(b))


class TestClusterXpaths:
    def test_empty(self):
        assert cluster_xpaths([], 2) == {}

    def test_single_cluster_when_k1(self):
        paths = ["/a[1]/b[1]", "/a[1]/b[2]", "/a[1]/c[1]"]
        assign = cluster_xpaths(paths, 1)
        assert len(set(assign.values())) == 1

    def test_separates_distant_path_families(self):
        list_paths = [f"/html[1]/body[1]/div[1]/ul[1]/li[{i}]/a[1]" for i in range(1, 6)]
        rec_paths = [f"/html[1]/body[1]/div[9]/span[{i}]" for i in range(1, 4)]
        assign = cluster_xpaths(list_paths + rec_paths, 2)
        list_ids = {assign[p] for p in list_paths}
        rec_ids = {assign[p] for p in rec_paths}
        assert len(list_ids) == 1 and len(rec_ids) == 1 and list_ids != rec_ids

    def test_cap_assigns_overflow_to_nearest(self):
        # z is weighted so it survives the cap; overflow b-paths must be
        # assigned to the (near) kept b-cluster, not to z.
        paths = [f"/a[1]/b[{i}]" for i in range(1, 10)] + ["/z[1]/q[1]/r[1]"]
        counts = [1] * 9 + [50]
        assign = cluster_xpaths(paths, 2, counts=counts, cap=5)
        assert set(assign) == set(paths)
        b_ids = {assign[p] for p in paths[:9]}
        assert len(b_ids) == 1
        assert assign["/z[1]/q[1]/r[1]"] != assign["/a[1]/b[1]"]

    def test_k_clamped_to_unique_paths(self):
        assign = cluster_xpaths(["/a[1]", "/a[1]"], 5)
        assert len(assign) == 1

    def test_deterministic(self):
        paths = [f"/a[1]/b[{i}]/c[1]" for i in range(1, 8)] + ["/d[1]/e[1]"]
        assert cluster_xpaths(paths, 2) == cluster_xpaths(paths, 2)


class TestListPatterns:
    def test_no_pattern_from_single(self):
        assert list_patterns(["/a[1]/b[1]"]) == []

    def test_wildcard_at_varying_index(self):
        pats = list_patterns(["/a[1]/b[1]", "/a[1]/b[3]"])
        assert pats == [(("a", 1), ("b", None))]

    def test_constant_positions_kept(self):
        pats = list_patterns(["/a[1]/b[1]/c[2]", "/a[1]/b[2]/c[2]"])
        assert pats == [(("a", 1), ("b", None), ("c", 2))]

    def test_different_tag_sequences_grouped_separately(self):
        pats = list_patterns(["/a[1]/b[1]", "/a[1]/c[1]", "/a[1]/b[2]"])
        assert len(pats) == 1  # only the b-group has ≥2 members

    def test_matches_pattern(self):
        pat = (("a", 1), ("b", None))
        assert matches_pattern("/a[1]/b[7]", pat)
        assert not matches_pattern("/a[2]/b[7]", pat)
        assert not matches_pattern("/a[1]/c[7]", pat)
        assert not matches_pattern("/a[1]/b[1]/c[1]", pat)
