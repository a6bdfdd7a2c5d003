"""Proportion models (PSSFBC / PBSFBC) vs brute force and degeneracy claims."""
import pytest

from repro.core.bruteforce import brute_bsfbc, brute_ssfbc
from repro.core.cfcore import bcfcore, cfcore
from repro.core.proportion import (
    bfair_bcem_pro,
    fair_bcem_pro,
    search_pbsfbc,
    search_pssfbc,
)
from repro.graph.generators import random_bipartite

THETA_GRID = [(1, 1, 1, 0.4), (1, 2, 2, 0.3), (2, 2, 2, 0.45), (1, 1, 2, 0.5), (2, 1, 1, 0.25)]


@pytest.mark.parametrize("seed", range(8))
@pytest.mark.parametrize("alpha,beta,delta,theta", THETA_GRID)
def test_pssfbc_matches_bruteforce(seed, alpha, beta, delta, theta):
    g = random_bipartite(6, 6, 0.6, seed=seed)
    truth = brute_ssfbc(g, alpha, beta, delta, theta)
    got = search_pssfbc(cfcore(g, alpha, beta), alpha, beta, delta, theta)
    assert len(got) == len(set(got))
    assert set(got) == truth


@pytest.mark.parametrize("seed", range(8))
@pytest.mark.parametrize("alpha,beta,delta,theta", THETA_GRID)
def test_pbsfbc_matches_bruteforce(seed, alpha, beta, delta, theta):
    g = random_bipartite(6, 6, 0.6, seed=seed)
    truth = brute_bsfbc(g, alpha, beta, delta, theta)
    got = search_pbsfbc(bcfcore(g, alpha, beta), alpha, beta, delta, theta)
    assert len(got) == len(set(got))
    assert set(got) == truth


@pytest.mark.parametrize("seed", range(6))
def test_theta_half_degenerates_to_delta_zero(seed):
    """Paper Exp-7: theta = 0.5 equals the plain model with delta = 0."""
    g = random_bipartite(7, 7, 0.55, seed=seed)
    pro = brute_ssfbc(g, 1, 1, 3, theta=0.5)
    plain = brute_ssfbc(g, 1, 1, 0)
    assert pro == plain


@pytest.mark.parametrize("seed", range(4))
def test_theta_monotone_counts(seed):
    """Smaller theta is a weaker constraint: every theta=0.45 result is
    maximal for theta=0.45 but the *satisfying* sets grow as theta drops —
    check via the algorithms that counts do not explode incoherently."""
    g = random_bipartite(7, 7, 0.6, seed=seed)
    gp = cfcore(g, 1, 1)
    lo = set(search_pssfbc(gp, 1, 1, 2, 0.2))
    hi = set(search_pssfbc(gp, 1, 1, 2, 0.5))
    # Every theta=0.5-result is proportion-fair for theta=0.2 as well;
    # maximality may differ, so just check both are valid & nonempty-ish.
    for _, r in hi:
        assert len(r) >= 2 or not lo
    assert isinstance(lo, set) and isinstance(hi, set)


def test_end_to_end_wrappers():
    g = random_bipartite(6, 6, 0.6, seed=3)
    assert set(fair_bcem_pro(g, 1, 1, 1, 0.4)) == brute_ssfbc(g, 1, 1, 1, 0.4)
    assert set(bfair_bcem_pro(g, 1, 1, 1, 0.4)) == brute_bsfbc(g, 1, 1, 1, 0.4)


@pytest.mark.parametrize("theta", [0.0, 0.6, 1.0])
def test_invalid_theta_rejected(theta):
    g = random_bipartite(4, 4, 0.5, seed=0)
    with pytest.raises(ValueError):
        # surfaces from CombinationPro on the first non-fair maximal biclique,
        # or from the upper-side expansion; either way it must raise.
        search_pbsfbc(g, 1, 1, 1, theta)
