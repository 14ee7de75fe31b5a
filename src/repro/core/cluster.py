"""Agglomerative clustering of XPaths by Levenshtein distance (§3.2.2).

The paper clusters all potential object mentions of a predicate across
a website and prefers mentions in larger clusters. scikit-learn is not
available offline, so we implement average-linkage agglomerative
clustering directly (numpy distance matrix, iterative closest-pair
merging) with the edit distance computed over XPath *steps* — the
``tag[idx]`` tokens — which is the natural unit for DOM paths.

XPaths repeat heavily across a site's pages, so clustering runs over
unique paths weighted by multiplicity; an optional cap bounds the
O(n²) matrix, with excess paths assigned to the nearest kept path.
"""
from __future__ import annotations

import numpy as np

from repro.dom.tree import xpath_tokens


def levenshtein(a: tuple, b: tuple) -> int:
    """Edit distance between two token sequences."""
    if a == b:
        return 0
    la, lb = len(a), len(b)
    if la == 0 or lb == 0:
        return la or lb
    prev = list(range(lb + 1))
    for i in range(1, la + 1):
        cur = [i] + [0] * lb
        ai = a[i - 1]
        for j in range(1, lb + 1):
            cur[j] = min(
                prev[j] + 1,
                cur[j - 1] + 1,
                prev[j - 1] + (ai != b[j - 1]),
            )
        prev = cur
    return prev[lb]


def _distance_matrix(tokenized: list) -> np.ndarray:
    n = len(tokenized)
    d = np.zeros((n, n))
    for i in range(n):
        for j in range(i + 1, n):
            d[i, j] = d[j, i] = levenshtein(tokenized[i], tokenized[j])
    return d


def cluster_xpaths(
    paths: list,
    n_clusters: int,
    *,
    counts: list | None = None,
    cap: int = 400,
) -> dict:
    """Cluster unique ``paths`` into ``n_clusters`` groups.

    Returns ``{path: cluster_id}``. ``counts`` (mention multiplicity per
    path) only affects which paths survive the ``cap``; cluster *sizes*
    are computed by the caller from multiplicities.
    """
    uniq = list(dict.fromkeys(paths))
    if not uniq:
        return {}
    n_clusters = max(1, min(n_clusters, len(uniq)))
    if counts is None:
        counts = [1] * len(uniq)
    weight = dict(zip(uniq, counts))
    kept = sorted(uniq, key=lambda p: (-weight.get(p, 1), p))[:cap]
    overflow = [p for p in uniq if p not in set(kept)]

    toks = [tuple(xpath_tokens(p)) for p in kept]
    d = _distance_matrix(toks)

    # Average-linkage agglomeration: repeatedly merge the closest pair
    # of clusters until n_clusters remain.
    clusters: list[list[int]] = [[i] for i in range(len(kept))]
    cd = d.copy()
    np.fill_diagonal(cd, np.inf)
    active = list(range(len(kept)))
    sizes = {i: 1 for i in active}
    while len(active) > n_clusters:
        sub = cd[np.ix_(active, active)]
        k = int(np.argmin(sub))
        ai, aj = divmod(k, len(active))
        i, j = active[ai], active[aj]
        if i > j:
            i, j = j, i
        # average linkage update of row i
        ni, nj = sizes[i], sizes[j]
        merged_row = (cd[i, :] * ni + cd[j, :] * nj) / (ni + nj)
        cd[i, :] = merged_row
        cd[:, i] = merged_row
        cd[i, i] = np.inf
        clusters[i].extend(clusters[j])
        sizes[i] = ni + nj
        active.remove(j)

    assignment: dict = {}
    for cid, root in enumerate(active):
        for idx in clusters[root]:
            assignment[kept[idx]] = cid
    for p in overflow:
        pt = tuple(xpath_tokens(p))
        best = min(kept, key=lambda q: levenshtein(pt, tuple(xpath_tokens(q))))
        assignment[p] = assignment[best]
    return assignment
