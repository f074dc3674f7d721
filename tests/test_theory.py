"""Paper theory: Lemma 1, Theorem 2, Theorem 3 (+ Fig. 1 simulation)."""
import numpy as np
import pytest

from repro.core import theory


@pytest.mark.parametrize("seed", range(8))
@pytest.mark.parametrize("n", [3, 10, 100])
def test_lemma1_random_distributions(seed, n):
    rng = np.random.default_rng(seed)
    pi = rng.random(n)
    pi /= pi.sum()
    assert theory.lemma1_holds(pi)


def test_lemma1_uniform_boundary():
    assert theory.lemma1_holds(np.full(10, 0.1))


@pytest.mark.parametrize("seed", range(8))
def test_theorem2_coefficient_in_unit_interval(seed):
    rng = np.random.default_rng(seed)
    pi = rng.random(50)
    pi /= pi.sum()
    a = theory.theorem2_coefficient(pi)
    assert 0 < a <= 1
    # q(y|x) = 1/n >= a * pi(y) for all y (Theorem 2's construction).
    assert (1.0 / 50 >= a * pi - 1e-12).all()


def test_theorem2_uniform_gives_a_equal_one():
    assert theory.theorem2_coefficient(np.full(20, 0.05)) == pytest.approx(1.0)


def test_kl_divergence_properties():
    p = np.array([0.5, 0.3, 0.2])
    assert theory.kl_divergence(p, p) == pytest.approx(0.0, abs=1e-9)
    q = np.array([0.2, 0.3, 0.5])
    assert theory.kl_divergence(p, q) > 0


def test_tv_distance_properties():
    p = np.array([0.5, 0.5, 0.0])
    q = np.array([0.0, 0.5, 0.5])
    assert theory.tv_distance(p, p) == 0
    assert theory.tv_distance(p, q) == pytest.approx(0.5)


# ----------------------------------------------------------------------
# Theorem 3 and its Appendix-A coefficients
# ----------------------------------------------------------------------
def test_kappa_high_uniform_target():
    # t = n (all maximal): kappa_h = max(1/(t*pmax)-1, 1) = 1.
    assert theory.kappa_high(np.full(10, 0.1)) == pytest.approx(1.0)


def test_kappa_formulas_manual():
    pi = np.array([0.5, 0.3, 0.2])
    # t=1, pmax=.5 -> kappa_h = max(1/.5-1, 1) = 1
    assert theory.kappa_high(pi) == pytest.approx(1.0)
    # kappa_r = max(1-1/(3*.5), 1/(3*.2)-1) = max(1/3, 2/3)
    assert theory.kappa_random(pi) == pytest.approx(2 / 3)


@pytest.mark.parametrize(
    "n,t,ratio,expect_high_better",
    [
        # Case 1.2 of the proof: pmax < 1/(2t) and pmax/pmin > n/t.
        (1000, 5, 2000.0, True),
        (1000, 50, 1000.0, True),
        # Near-uniform target: random init should not lose.
        (1000, 200, 1.5, False),
        (500, 400, 1.2, False),
    ],
)
def test_theorem3_condition_examples(n, t, ratio, expect_high_better):
    rng = np.random.default_rng(0)
    pi = theory.make_target_distribution(n, t, ratio, rng)
    assert theory.theorem3_condition(pi) == expect_high_better


def _two_level_target(n, t, ratio):
    """Fig.-1-style strongly skewed target: t elements at π_max, the
    remaining n−t at π_max/ratio."""
    pi = np.full(n, 1.0 / ratio)
    pi[:t] = 1.0
    return pi / pi.sum()


@pytest.mark.parametrize("seed", range(3))
@pytest.mark.parametrize(
    "n,t,ratio,n_samples",
    [(100, 2, 1000.0, 25), (100, 5, 1000.0, 40), (200, 4, 500.0, 60)],
)
def test_fig1_simulation_skewed_targets_favor_high_weight(
    seed, n, t, ratio, n_samples
):
    """Fig. 1 protocol: for skewed targets satisfying Eq. 12 and a small
    sampling budget, the KL of the high-weight-initialized sampler is
    lower than random-initialized (averaged over repetitions)."""
    pi = _two_level_target(n, t, ratio)
    assert theory.theorem3_condition(pi)
    kl_r = kl_h = 0.0
    for r in range(60):
        rr = np.random.default_rng((seed, r))
        kl_r += theory.kl_divergence(
            pi, theory.simulate_mh_chain(pi, n_samples, rr, init="random")
        )
        kl_h += theory.kl_divergence(
            pi, theory.simulate_mh_chain(pi, n_samples, rr, init="weight")
        )
    assert kl_r / kl_h > 1.05


def test_fig1_simulation_near_uniform_targets_no_high_weight_gain():
    """For near-uniform targets the two inits are statistically
    indistinguishable (ratio of KLs ~ 1)."""
    rng = np.random.default_rng(0)
    pi = theory.make_target_distribution(100, 40, 1.3, rng)
    kl_r = kl_h = 0.0
    for r in range(10):
        rr = np.random.default_rng(r)
        kl_r += theory.kl_divergence(
            pi, theory.simulate_mh_chain(pi, 500, rr, init="random")
        )
        kl_h += theory.kl_divergence(
            pi, theory.simulate_mh_chain(pi, 500, rr, init="weight")
        )
    assert 0.5 < kl_r / kl_h < 2.0


def test_burn_in_reduces_kl_for_bad_start():
    """Burn-in (discarding initial samples) improves the empirical
    distribution for a few-sample budget from a random start."""
    rng = np.random.default_rng(1)
    pi = theory.make_target_distribution(200, 5, 1000.0, rng)
    kl_no = kl_burn = 0.0
    for r in range(10):
        rr = np.random.default_rng((1, r))
        kl_no += theory.kl_divergence(
            pi, theory.simulate_mh_chain(pi, 300, rr, init="random", burn_in=0)
        )
        kl_burn += theory.kl_divergence(
            pi, theory.simulate_mh_chain(pi, 300, rr, init="random", burn_in=1000)
        )
    assert kl_burn < kl_no


def test_geometric_convergence_bound_theorem1():
    """Theorem 1: KL(pi^i, pi) <= kappa*rho^i (1 + kappa*rho^i) with
    a = 1/(n*pmax). Verified by exact chain iteration (transition
    matrix of the uniform-proposal M-H chain)."""
    rng = np.random.default_rng(2)
    pi = theory.make_target_distribution(30, 3, 50.0, rng)
    n = pi.shape[0]
    # Exact M-H transition matrix with uniform proposal.
    P = np.zeros((n, n))
    for x in range(n):
        for y in range(n):
            if x == y:
                continue
            P[x, y] = (1.0 / n) * min(1.0, pi[y] / pi[x])
        P[x, x] = 1.0 - P[x].sum()
    a = theory.theorem2_coefficient(pi)
    rho = 1 - a
    dist = np.full(n, 1.0 / n)
    kappa = np.max(np.abs(dist / pi - 1.0))
    for i in range(1, 60):
        dist = dist @ P
        bound = kappa * rho**i * (1 + kappa * rho**i)
        assert theory.kl_divergence(dist, pi) <= bound + 1e-9


def test_make_target_distribution_shape():
    rng = np.random.default_rng(0)
    pi = theory.make_target_distribution(100, 7, 40.0, rng)
    assert pi.shape == (100,)
    np.testing.assert_allclose(pi.sum(), 1.0)
    assert int(np.isclose(pi, pi.max()).sum()) == 7
    assert pi.max() / pi.min() == pytest.approx(40.0, rel=1e-6)
