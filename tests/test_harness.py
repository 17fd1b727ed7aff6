"""Tests for workload construction and spread evaluation."""
import numpy as np
import pytest

from repro.experiments.harness import (
    Workload,
    assign_model,
    build_workload,
    pick_seeds,
)
from repro.graphs.propagation import TR_PROBS
from repro.graphs.transform import SUPER_SEED


def test_pick_seeds_deterministic_and_distinct():
    a = pick_seeds(1000, 10, seed=3)
    b = pick_seeds(1000, 10, seed=3)
    assert a == b
    assert len(set(a)) == 10
    assert all(0 <= s < 1000 for s in a)


def test_pick_seeds_caps_at_n():
    assert len(pick_seeds(5, 10, seed=0)) == 5


def test_assign_model_dispatch(spark):
    from repro.graphs.datasets import load

    edges = load(spark, "EmailCore", scale=0.05, seed=0)
    tr = assign_model(edges, "TR", seed=0)
    assert {r["p"] for r in tr.select("p").distinct().collect()} <= set(TR_PROBS)
    wc = assign_model(edges, "WC")
    assert wc.columns == ["src", "dst", "p"]
    with pytest.raises(ValueError):
        assign_model(edges, "LT")


@pytest.fixture(scope="module")
def wl(spark):
    return build_workload(spark, "EmailCore", "WC", scale=0.2, n_seeds=5, seed=1)


def test_workload_shape(wl):
    assert wl.dataset == "EmailCore" and wl.model == "WC"
    assert len(wl.seeds) == 5
    assert wl.graph.orig_ids[wl.graph.seed] == SUPER_SEED
    # no original seed id survives in the merged graph
    assert not (set(wl.seeds) & set(wl.graph.orig_ids.tolist()))


def test_blocked_mask_roundtrip(wl):
    some = [int(o) for o in wl.graph.orig_ids[:5] if o != SUPER_SEED][:3]
    mask = wl.to_blocked_mask(some)
    assert mask.sum() == len(some)
    # unknown ids and seed ids are silently skipped
    assert wl.to_blocked_mask([10**9]).sum() == 0
    assert wl.to_blocked_mask(wl.seeds).sum() == 0


def test_eval_spread_floor_is_seed_count(wl):
    """Blocking every out-neighbor of s' floors the spread at |S|."""
    heads, _ = wl.graph.out_edges(wl.graph.seed)
    blockers = [int(wl.graph.orig_ids[u]) for u in np.unique(heads)]
    got = wl.eval_spread(blockers, r=200, seed=0)
    assert got == pytest.approx(len(wl.seeds))


def test_eval_spread_unblocked_at_least_seed_count(wl):
    assert wl.eval_spread([], r=200, seed=0) >= len(wl.seeds)


def test_eval_spread_monotone_in_blockers(wl):
    heads, _ = wl.graph.out_edges(wl.graph.seed)
    blockers = [int(wl.graph.orig_ids[u]) for u in np.unique(heads)[:3]]
    all_b = wl.eval_spread(blockers, r=300, seed=2)
    none = wl.eval_spread([], r=300, seed=2)
    assert all_b <= none + 1e-9


def test_workload_deterministic(spark):
    a = build_workload(spark, "Wiki-Vote", "TR", scale=0.05, n_seeds=3, seed=7)
    b = build_workload(spark, "Wiki-Vote", "TR", scale=0.05, n_seeds=3, seed=7)
    assert a.seeds == b.seeds
    np.testing.assert_array_equal(a.graph.indices, b.graph.indices)
    np.testing.assert_array_equal(a.graph.probs, b.graph.probs)
