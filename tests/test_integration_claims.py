"""Integration tests pinning the paper's headline *shape* claims at test
scale — the property-level regression net over the whole pipeline."""
import pytest

from repro.eval.harness import run_method


@pytest.fixture(scope="module")
def rest_results(restaurant_ds):
    out = {}
    for m, params in [
        ("SA-PSN", {}),
        ("SA-PSAB", {}),
        ("GS-PSN", {"w_max": 20}),
        ("PPS", {}),
    ]:
        out[m] = run_method(restaurant_ds, m, ec_max=10.0, **params)
    return out


def test_advanced_beat_naive_on_structured(rest_results):
    # §7.1: every advanced method dominates both naïve ones.
    for adv in ("GS-PSN", "PPS"):
        for naive in ("SA-PSN", "SA-PSAB"):
            assert (
                rest_results[adv].auc_star[10.0]
                > rest_results[naive].auc_star[10.0]
            ), f"{adv} should beat {naive}"


def test_restaurant_near_ideal_for_best_method(rest_results):
    # Fig 9b: the best schema-agnostic method is close to the ideal one.
    best = max(r.auc_star[1.0] for r in rest_results.values())
    assert best > 0.8


def test_equality_beats_similarity_on_rdf(freebase_tiny):
    # §7.2/§8: URI-dominated data → equality-based robust, similarity poor.
    pbs = run_method(freebase_tiny, "PBS", ec_max=10.0)
    ls = run_method(freebase_tiny, "LS-PSN", ec_max=10.0)
    assert pbs.auc_star[10.0] > ls.auc_star[10.0]


def test_same_eventual_quality_within_candidate_space(movies_tiny):
    # §3.1: a longer budget never loses matches found under a shorter one
    # (the capped stream is a prefix of the full static order).
    short = run_method(movies_tiny, "PPS", ec_max=2.0)
    long = run_method(movies_tiny, "PPS", ec_max=10.0)
    assert set(short.detections.tolist()) <= set(long.detections.tolist())
    assert long.recall[10.0] >= short.recall[2.0]
