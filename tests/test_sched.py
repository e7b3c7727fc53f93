"""Multi-GPU scheduling policy tests (SS7.1): assignment invariants and the
load-balance behaviour the paper's Figs 8-10 demonstrate."""
import numpy as np
import pytest

from repro.sched.policies import (
    POLICIES,
    assign,
    chunked_round_robin_order,
    per_gpu_time,
    simulate,
)


def skewed_costs(m=20_000, seed=0):
    """Edge-task costs of a power-law graph in Omega order: each vertex
    contributes a contiguous run of edges whose cost ~ its degree, hubs
    first (CSR order). Even-split hands whole hub runs to the first GPUs
    (Fig 8); chunked round-robin slices every run across GPUs."""
    g = np.random.default_rng(seed)
    degs = []
    total = 0
    rank = 1
    while total < m:
        d = min(int(2_000 / rank**0.8) + 1, m - total)
        degs.append(d)
        total += d
        rank += 1
    costs = np.concatenate([np.full(d, d, dtype=np.float64) for d in degs])
    return costs[:m]


@pytest.mark.parametrize("policy", POLICIES)
@pytest.mark.parametrize("n", [1, 2, 3, 4, 8])
def test_assignment_covers_all_tasks(policy, n):
    bins = assign(1000, n, policy)
    assert len(bins) == 1000
    assert bins.min() >= 0 and bins.max() < n


@pytest.mark.parametrize("policy", POLICIES)
def test_assignment_roughly_balanced_in_count(policy):
    bins = assign(10_000, 4, policy)
    counts = np.bincount(bins, minlength=4)
    assert counts.max() - counts.min() <= 2600  # even in cardinality


def test_even_split_is_contiguous():
    bins = assign(100, 4, "even_split")
    assert (np.diff(bins) >= 0).all()
    assert np.bincount(bins).tolist() == [25, 25, 25, 25]


def test_round_robin_cycles():
    bins = assign(10, 3, "round_robin")
    assert bins.tolist() == [0, 1, 2, 0, 1, 2, 0, 1, 2, 0]


def test_chunked_generalises_even_split():
    m, n = 1000, 4
    a = assign(m, n, "chunked_rr", chunk=-(-m // n))
    b = assign(m, n, "even_split")
    assert np.array_equal(a, b)


def test_chunked_generalises_round_robin():
    a = assign(100, 4, "chunked_rr", chunk=1)
    b = assign(100, 4, "round_robin")
    assert np.array_equal(a, b)


def test_bad_policy_and_params():
    with pytest.raises(ValueError):
        assign(10, 2, "magic")
    with pytest.raises(ValueError):
        assign(10, 0, "even_split")
    with pytest.raises(ValueError):
        assign(10, 2, "chunked_rr", chunk=0)


def test_chunked_order_is_permutation():
    perm = chunked_round_robin_order(1000, 7, chunk=16)
    assert sorted(perm.tolist()) == list(range(1000))


def test_per_gpu_time_sums_to_total():
    costs = skewed_costs(5000)
    bins = assign(len(costs), 4, "chunked_rr")
    times = per_gpu_time(costs, bins, 4)
    assert np.isclose(times.sum(), costs.sum())


# -- the Fig 8/9/10 behaviour --------------------------------------------

def test_even_split_collapses_on_skew():
    """Fig 8: under even-split one GPU inherits the hubs."""
    costs = skewed_costs()
    es = simulate(costs, 4, "even_split")
    cr = simulate(costs, 4, "chunked_rr")
    assert es["imbalance"] > 1.5
    assert cr["imbalance"] < 1.1
    assert cr["makespan"] < es["makespan"]


@pytest.mark.parametrize("n", [2, 3, 4, 8])
def test_chunked_scales_nearly_linearly(n):
    """Fig 9: chunked round-robin speedup ~ n."""
    costs = skewed_costs()
    r = simulate(costs, n, "chunked_rr")
    assert r["speedup"] > 0.9 * n


def test_even_split_speedup_saturates():
    """Fig 9: even-split fails to scale with GPU count on skewed input."""
    costs = skewed_costs()
    s4 = simulate(costs, 4, "even_split")["speedup"]
    s8 = simulate(costs, 8, "even_split")["speedup"]
    assert s8 < 8 * 0.75  # far from linear
    assert s4 < 4


def test_per_gpu_variance_fig10():
    """Fig 10: per-GPU times vary wildly for even-split, not chunked."""
    costs = skewed_costs()
    es = simulate(costs, 4, "even_split")["per_gpu"]
    cr = simulate(costs, 4, "chunked_rr")["per_gpu"]
    assert es.max() / es.min() > 2.0
    assert cr.max() / cr.min() < 1.2


def test_single_gpu_trivial():
    costs = skewed_costs(100)
    r = simulate(costs, 1, "even_split")
    assert np.isclose(r["makespan"], costs.sum())
    assert np.isclose(r["speedup"], 1.0)


def test_empty_costs():
    r = simulate(np.array([]), 4, "chunked_rr")
    assert r["makespan"] == 0.0
