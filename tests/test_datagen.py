"""Tests for the synthetic dataset generators."""
import numpy as np
import pandas as pd
import pytest

from repro.datagen.stock import ATTRIBUTES, stock_lite
from repro.datagen.truthdata import birthplaces_lite, heritages_lite
from repro.datagen.workers import simulate_workers
from repro.hierarchy.numeric import decimal_places


@pytest.fixture(scope="module")
def bp():
    return birthplaces_lite(sf=0.02, seed=0)


@pytest.fixture(scope="module")
def her():
    return heritages_lite(sf=0.05, seed=1)


class TestBirthplaces:
    def test_deterministic(self, bp):
        again = birthplaces_lite(sf=0.02, seed=0)
        pd.testing.assert_frame_equal(bp.records, again.records)
        pd.testing.assert_frame_equal(bp.gold, again.gold)

    def test_seed_changes_data(self, bp):
        other = birthplaces_lite(sf=0.02, seed=99)
        assert not bp.records.equals(other.records)

    def test_seven_sources(self, bp):
        assert bp.records["source"].nunique() == 7

    def test_one_claim_per_object_source(self, bp):
        assert not bp.records.duplicated(["object", "source"]).any()

    def test_every_object_has_record(self, bp):
        assert set(bp.gold["object"]) == set(bp.records["object"].unique())

    def test_values_in_hierarchy(self, bp):
        assert all(v in bp.hierarchy for v in bp.records["value"])
        assert all(v != bp.hierarchy.root for v in bp.records["value"])

    def test_truths_in_hierarchy(self, bp):
        assert all(t in bp.hierarchy for t in bp.gold["truth"])

    def test_source_profiles_are_distributions(self, bp):
        s = bp.source_profiles[["phi1", "phi2", "phi3"]].sum(axis=1)
        assert np.allclose(s, 1.0)

    def test_scale_factor_controls_objects(self):
        small = birthplaces_lite(sf=0.01)
        big = birthplaces_lite(sf=0.05)
        assert len(big.gold) > len(small.gold)

    def test_candidates_accessor(self, bp):
        cand = bp.candidates()
        assert set(cand.columns) == {"object", "value"}
        assert not cand.duplicated().any()

    def test_generalized_claims_exist(self, bp):
        """Sources do claim proper ancestors of the truth (Figure 1)."""
        gold = dict(zip(bp.gold["object"], bp.gold["truth"]))
        n_gen = sum(
            1
            for o, v in zip(bp.records["object"], bp.records["value"])
            if bp.hierarchy.is_ancestor(v, gold[o])
        )
        assert n_gen > 0

    def test_mean_exact_accuracy_near_072(self):
        ds = birthplaces_lite(sf=0.3, seed=0)
        gold = dict(zip(ds.gold["object"], ds.gold["truth"]))
        acc = np.mean([gold[o] == v for o, v in zip(ds.records["object"], ds.records["value"])])
        assert 0.55 < acc < 0.85

    def test_coverage_is_skewed(self):
        ds = birthplaces_lite(sf=0.3, seed=0)
        per_obj = ds.records.groupby("object").size()
        assert per_obj.max() >= 5 and per_obj.min() <= 2


class TestHeritages:
    def test_many_sources_few_claims(self, her):
        n_src = her.records["source"].nunique()
        claims_per_source = len(her.records) / n_src
        assert n_src >= 10
        assert claims_per_source < 15

    def test_lower_mean_accuracy_than_birthplaces(self):
        bp = birthplaces_lite(sf=0.3, seed=0)
        her = heritages_lite(sf=0.3, seed=1)

        def acc(ds):
            gold = dict(zip(ds.gold["object"], ds.gold["truth"]))
            return np.mean(
                [gold[o] == v for o, v in zip(ds.records["object"], ds.records["value"])]
            )

        assert acc(her) < acc(bp)

    def test_deterministic(self, her):
        again = heritages_lite(sf=0.05, seed=1)
        pd.testing.assert_frame_equal(her.records, again.records)

    def test_taller_hierarchy(self, her):
        assert her.hierarchy.height == 6

    def test_at_least_two_claims_per_object(self, her):
        assert her.records.groupby("object").size().min() >= 2


class TestWorkers:
    def test_count_and_determinism(self):
        w1 = simulate_workers(10, pi_p=0.75, seed=3)
        w2 = simulate_workers(10, pi_p=0.75, seed=3)
        assert [w.p_correct for w in w1] == [w.p_correct for w in w2]
        assert len(w1) == 10

    def test_accuracy_range(self):
        ws = simulate_workers(100, pi_p=0.75, seed=0)
        ps = [w.p_correct for w in ws]
        assert min(ps) >= 0.70 - 1e-9 and max(ps) <= 0.80 + 1e-9

    def test_answers_mostly_correct(self):
        w = simulate_workers(1, pi_p=0.95, seed=0)[0]
        rng = np.random.default_rng(0)
        answers = [w.answer(rng, ["a", "b", "c"], "b") for _ in range(500)]
        assert answers.count("b") > 400

    def test_answer_without_gold_candidate_is_random(self):
        w = simulate_workers(1, pi_p=1.0, seed=0)[0]
        rng = np.random.default_rng(0)
        ans = {w.answer(rng, ["a", "b"], "zz") for _ in range(50)}
        assert ans == {"a", "b"}


class TestStock:
    @pytest.mark.parametrize("attr", ATTRIBUTES)
    def test_deterministic(self, attr):
        a = stock_lite(attr, sf=0.02, seed=7)
        b = stock_lite(attr, sf=0.02, seed=7)
        pd.testing.assert_frame_equal(a.records, b.records)

    def test_unknown_attribute_rejected(self):
        with pytest.raises(ValueError):
            stock_lite("volume")

    @pytest.mark.parametrize("attr", ATTRIBUTES)
    def test_values_are_decimal_strings(self, attr):
        ds = stock_lite(attr, sf=0.02)
        for v in ds.records["value"]:
            float(v)  # parses

    def test_precision_heterogeneity(self):
        ds = stock_lite("change_rate", sf=0.05)
        dps = {decimal_places(v) for v in ds.records["value"]}
        assert len(dps) >= 2  # several rounding levels present

    def test_at_least_two_sources_per_object(self):
        ds = stock_lite("eps", sf=0.02)
        assert ds.records.groupby("object").size().min() >= 2

    def test_gold_matches_objects(self):
        ds = stock_lite("open_price", sf=0.02)
        assert set(ds.gold["object"]) >= set(ds.records["object"].unique())
