"""Fair sets, maximal fair subsets, and their combinatorial enumeration.

Implements Definition 11 (fair set), Definition 12 / Algorithm 4
(``MFSCheck``), Algorithm 7 (``Combination``), and the proportion variant
``CombinationPro`` (Sec. III-D). A brute-force maximal-fair-subset
enumerator is provided as a test oracle.

Throughout, an "attributed set" is represented as any iterable of vertex
ids together with a ``val`` mapping and an explicit attribute domain — the
fairness definitions quantify over the *full* domain, so an attribute value
with zero members makes the set unfair whenever the size threshold is >= 1.
"""
from __future__ import annotations

import itertools
import math
from collections import Counter
from typing import Hashable, Iterable, Mapping, Sequence


def attr_counts(
    s: Iterable[int], val: Mapping[int, Hashable], domain: Sequence[Hashable]
) -> dict[Hashable, int]:
    """Per-attribute-value cardinalities ``|S_{a_i}|`` over the full domain."""
    c = Counter(val[x] for x in s)
    return {a: c.get(a, 0) for a in domain}


def is_fair_set(
    s: Iterable[int],
    val: Mapping[int, Hashable],
    domain: Sequence[Hashable],
    k: int,
    delta: int,
) -> bool:
    """Definition 11: every attribute count >= k and pairwise diffs <= delta."""
    counts = list(attr_counts(s, val, domain).values())
    return min(counts) >= k and max(counts) - min(counts) <= delta


def is_proportion_fair_set(
    s: Iterable[int],
    val: Mapping[int, Hashable],
    domain: Sequence[Hashable],
    k: int,
    delta: int,
    theta: float,
) -> bool:
    """Definition 5 condition (2)+(3): fair set whose every attribute ratio >= theta."""
    counts = attr_counts(s, val, domain)
    total = sum(counts.values())
    if not is_fair_set(s, val, domain, k, delta):
        return False
    # total == 0 is unreachable here for k >= 1; guard for k == 0.
    return total == 0 or min(counts.values()) / total >= theta


def mfs_check(
    s: Iterable[int],
    s_hat: Iterable[int],
    val: Mapping[int, Hashable],
    domain: Sequence[Hashable],
    k: int,
    delta: int,
    theta: float | None = None,
) -> bool:
    """Algorithm 4: is ``s_hat`` a maximal fair subset of ``s``?

    With ``theta`` set, fairness means *proportion* fairness (used by the
    Pro variants, which must re-check the ratio constraint per the paper's
    Sec. IV-C note).

    Faithful to the pseudo-code: (1) fail if some attribute of ``s_hat`` is
    below ``k``; (2) fail if every attribute still has spare vertices in
    ``s - s_hat`` (then one vertex per attribute can be added, which keeps
    all pairwise differences and, for theta <= 0.5, every ratio); (3) fail
    if any single spare vertex can be added while keeping fairness.
    """
    fair = (
        (lambda t: is_fair_set(t, val, domain, k, delta))
        if theta is None
        else (lambda t: is_proportion_fair_set(t, val, domain, k, delta, theta))
    )
    s_hat = set(s_hat)
    if not fair(s_hat):
        return False
    spare = [x for x in s if x not in s_hat]
    spare_by_attr: dict[Hashable, list[int]] = {a: [] for a in domain}
    for x in spare:
        spare_by_attr[val[x]].append(x)
    if all(spare_by_attr[a] for a in domain):
        return False
    for a in domain:
        if spare_by_attr[a]:
            # All spare vertices of one attribute are interchangeable here.
            if fair(s_hat | {spare_by_attr[a][0]}):
                return False
    return True


def _subsets_of_size(items: Sequence[int], size: int) -> list[frozenset[int]]:
    return [frozenset(c) for c in itertools.combinations(sorted(items), size)]


def combination(
    s: Iterable[int],
    val: Mapping[int, Hashable],
    domain: Sequence[Hashable],
    k: int,
    delta: int,
) -> list[frozenset[int]]:
    """Algorithm 7: all maximal fair subsets of ``s``.

    Each attribute class contributes exactly ``csize = min(|S_a|, msize +
    delta)`` vertices where ``msize`` is the smallest class size; the result
    is the cross-product of all csize-subsets per class. Returns [] if some
    class is below ``k``.
    """
    by_attr: dict[Hashable, list[int]] = {a: [] for a in domain}
    for x in s:
        by_attr[val[x]].append(x)
    if any(len(by_attr[a]) < k for a in domain):
        return []
    msize = min(len(by_attr[a]) for a in domain)
    per_attr: list[list[frozenset[int]]] = []
    for a in domain:
        csize = min(len(by_attr[a]), msize + delta)
        per_attr.append(_subsets_of_size(by_attr[a], csize))
    out: list[frozenset[int]] = []
    for combo in itertools.product(*per_attr):
        out.append(frozenset().union(*combo))
    return out


def combination_pro(
    s: Iterable[int],
    val: Mapping[int, Hashable],
    domain: Sequence[Hashable],
    k: int,
    delta: int,
    theta: float,
) -> list[frozenset[int]]:
    """CombinationPro (Sec. III-D): maximal *proportion* fair subsets.

    Identical to :func:`combination` but the class size is additionally
    capped at ``floor(msize * (1 - theta) / theta)``, derived from
    ``msize / (msize + csize) >= theta``.
    """
    if not 0 < theta <= 0.5:
        raise ValueError(f"theta must be in (0, 0.5], got {theta}")
    by_attr: dict[Hashable, list[int]] = {a: [] for a in domain}
    for x in s:
        by_attr[val[x]].append(x)
    if any(len(by_attr[a]) < k for a in domain):
        return []
    msize = min(len(by_attr[a]) for a in domain)
    ratio_cap = math.floor(msize * (1.0 - theta) / theta + 1e-9)
    per_attr: list[list[frozenset[int]]] = []
    for a in domain:
        csize = min(len(by_attr[a]), msize + delta, ratio_cap)
        per_attr.append(_subsets_of_size(by_attr[a], csize))
    out: list[frozenset[int]] = []
    for combo in itertools.product(*per_attr):
        out.append(frozenset().union(*combo))
    return out


def brute_maximal_fair_subsets(
    s: Iterable[int],
    val: Mapping[int, Hashable],
    domain: Sequence[Hashable],
    k: int,
    delta: int,
    theta: float | None = None,
) -> set[frozenset[int]]:
    """Definition-level oracle: all subsets that are fair with no fair proper superset."""
    fair = (
        (lambda t: is_fair_set(t, val, domain, k, delta))
        if theta is None
        else (lambda t: is_proportion_fair_set(t, val, domain, k, delta, theta))
    )
    items = sorted(s)
    fair_subsets = [
        frozenset(c)
        for r in range(len(items) + 1)
        for c in itertools.combinations(items, r)
        if fair(c)
    ]
    return {
        a
        for a in fair_subsets
        if not any(a < b for b in fair_subsets)
    }
