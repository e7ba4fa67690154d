"""Tests for the paper's quality measures (§5)."""
import pandas as pd
import pytest

from repro.eval import metrics as M
from repro.hierarchy import Hierarchy
from repro.hierarchy.tree import ROOT


@pytest.fixture()
def h():
    return Hierarchy(
        {
            ROOT: None,
            "USA": ROOT,
            "UK": ROOT,
            "NY": "USA",
            "LibertyIsland": "NY",
            "LA": "USA",
            "London": "UK",
        }
    )


def _truths(d):
    return pd.DataFrame({"object": list(d), "value": list(d.values())})


def _gold(d):
    return pd.DataFrame({"object": list(d), "truth": list(d.values())})


class TestAccuracy:
    def test_exact(self, h):
        assert M.accuracy(_truths({"o1": "NY"}), _gold({"o1": "NY"})) == 1.0

    def test_ancestor_not_exact(self, h):
        assert M.accuracy(_truths({"o1": "USA"}), _gold({"o1": "NY"})) == 0.0

    def test_fraction(self, h):
        t = _truths({"o1": "NY", "o2": "LA"})
        g = _gold({"o1": "NY", "o2": "London"})
        assert M.accuracy(t, g) == 0.5

    def test_missing_estimate_counts_wrong(self, h):
        assert M.accuracy(_truths({}), _gold({"o1": "NY"})) == 0.0


class TestGenAccuracy:
    def test_exact_counts(self, h):
        assert M.gen_accuracy(_truths({"o1": "NY"}), _gold({"o1": "NY"}), h) == 1.0

    def test_ancestor_counts(self, h):
        assert M.gen_accuracy(_truths({"o1": "USA"}), _gold({"o1": "LibertyIsland"}), h) == 1.0

    def test_descendant_does_not_count(self, h):
        assert M.gen_accuracy(_truths({"o1": "LibertyIsland"}), _gold({"o1": "NY"}), h) == 0.0

    def test_unrelated_zero(self, h):
        assert M.gen_accuracy(_truths({"o1": "UK"}), _gold({"o1": "NY"}), h) == 0.0

    def test_at_least_accuracy(self, h):
        t = _truths({"o1": "USA", "o2": "LA"})
        g = _gold({"o1": "NY", "o2": "LA"})
        assert M.gen_accuracy(t, g, h) >= M.accuracy(t, g)


class TestAvgDistance:
    def test_zero_when_exact(self, h):
        assert M.avg_distance(_truths({"o1": "NY"}), _gold({"o1": "NY"}), h) == 0.0

    def test_parent_distance_one(self, h):
        assert M.avg_distance(_truths({"o1": "USA"}), _gold({"o1": "NY"}), h) == 1.0

    def test_cross_branch(self, h):
        # LibertyIsland -> NY -> USA -> LA = 3 edges
        assert M.avg_distance(_truths({"o1": "LA"}), _gold({"o1": "LibertyIsland"}), h) == 3.0

    def test_averages(self, h):
        t = _truths({"o1": "NY", "o2": "USA"})
        g = _gold({"o1": "NY", "o2": "NY"})
        assert M.avg_distance(t, g, h) == 0.5

    def test_missing_estimate_worst_case(self, h):
        assert M.avg_distance(_truths({}), _gold({"o1": "NY"}), h) == h.height


class TestGoldMapping:
    def test_truth_in_candidates_kept(self, h):
        cand = pd.DataFrame({"object": ["o1", "o1"], "value": ["NY", "LA"]})
        out = M.map_gold_to_candidates(_gold({"o1": "NY"}), cand, h)
        assert out["truth"].iloc[0] == "NY"

    def test_maps_to_most_specific_ancestor(self, h):
        cand = pd.DataFrame({"object": ["o1", "o1"], "value": ["USA", "NY"]})
        out = M.map_gold_to_candidates(_gold({"o1": "LibertyIsland"}), cand, h)
        assert out["truth"].iloc[0] == "NY"

    def test_no_ancestor_keeps_raw(self, h):
        cand = pd.DataFrame({"object": ["o1"], "value": ["UK"]})
        out = M.map_gold_to_candidates(_gold({"o1": "NY"}), cand, h)
        assert out["truth"].iloc[0] == "NY"


class TestMultiTruth:
    def test_expand(self, h):
        assert M.expand_with_ancestors("LibertyIsland", h) == {
            "LibertyIsland",
            "NY",
            "USA",
        }

    def test_expand_root_excluded(self, h):
        assert ROOT not in M.expand_with_ancestors("LibertyIsland", h)

    def test_perfect(self, h):
        pred = {"o1": {"LibertyIsland", "NY", "USA"}}
        p, r, f1 = M.multi_truth_prf(pred, _gold({"o1": "LibertyIsland"}), h)
        assert (p, r, f1) == (1.0, 1.0, 1.0)

    def test_generalized_high_precision_low_recall(self, h):
        pred = {"o1": {"USA"}}
        p, r, f1 = M.multi_truth_prf(pred, _gold({"o1": "LibertyIsland"}), h)
        assert p == 1.0 and r == pytest.approx(1 / 3)

    def test_wrong_value_hurts_precision(self, h):
        pred = {"o1": {"UK", "NY", "USA", "LibertyIsland"}}
        p, r, _ = M.multi_truth_prf(pred, _gold({"o1": "LibertyIsland"}), h)
        assert p == 0.75 and r == 1.0

    def test_empty_prediction(self, h):
        p, r, f1 = M.multi_truth_prf({}, _gold({"o1": "NY"}), h)
        assert (p, r, f1) == (0.0, 0.0, 0.0)


class TestNumericMetrics:
    def test_mae(self):
        t = pd.DataFrame({"object": ["o1", "o2"], "value": [1.0, 3.0]})
        g = pd.DataFrame({"object": ["o1", "o2"], "truth": [1.0, 2.0]})
        mae, re_ = M.mae_re(t, g)
        assert mae == 0.5
        assert re_ == pytest.approx(0.25)

    def test_relative_error_guards_zero_truth(self):
        t = pd.DataFrame({"object": ["o1"], "value": [0.1]})
        g = pd.DataFrame({"object": ["o1"], "truth": [0.0]})
        _, re_ = M.mae_re(t, g)
        assert re_ > 0
