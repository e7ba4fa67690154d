"""Tests for the baseline truth-discovery algorithms."""
import numpy as np
import pandas as pd
import pytest

from repro.baselines.accu import accu, popaccu
from repro.baselines.asums import asums
from repro.baselines.crh import crh, crh_numeric
from repro.baselines.docs import docs, object_domains
from repro.baselines.lca import lca
from repro.baselines.lfc import lfc, lfc_mt
from repro.baselines.mdc import mdc
from repro.baselines.multitruth import dart, ltm
from repro.baselines.numeric import catd, chi2_quantile, mean_baseline
from repro.baselines.vote import vote
from repro.core.candidates import candidate_sets, hierarchical_ancestor_pairs
from repro.datagen.truthdata import birthplaces_lite
from repro.eval import metrics as M


@pytest.fixture(scope="module")
def ds():
    return birthplaces_lite(sf=0.02, seed=0)


@pytest.fixture(scope="module")
def gold(ds):
    return M.map_gold_to_candidates(candidate_sets(ds.records), candidate_sets(ds.records), ds.hierarchy) if False else M.map_gold_to_candidates(ds.gold, candidate_sets(ds.records), ds.hierarchy)


@pytest.fixture(scope="module")
def anc(ds):
    return hierarchical_ancestor_pairs(candidate_sets(ds.records), ds.hierarchy)


SIMPLE = pd.DataFrame(
    [
        ("o1", "s1", "a"), ("o1", "s2", "a"), ("o1", "s3", "b"),
        ("o2", "s1", "x"), ("o2", "s2", "y"), ("o2", "s3", "x"),
        ("o3", "s1", "p"), ("o3", "s2", "p"), ("o3", "s3", "p"),
    ],
    columns=["object", "source", "value"],
)


class TestVote:
    def test_majority_wins(self):
        t = vote(SIMPLE).truth_map()
        assert t == {"o1": "a", "o2": "x", "o3": "p"}

    def test_tie_breaks_to_smallest_value(self):
        recs = pd.DataFrame(
            [("o1", "s1", "b"), ("o1", "s2", "a")], columns=["object", "source", "value"]
        )
        assert vote(recs).truth_map()["o1"] == "a"

    def test_mu_normalized(self):
        res = vote(SIMPLE)
        assert np.allclose(res.mu.groupby("object")["mu"].sum(), 1.0)

    def test_answers_counted(self):
        answers = pd.DataFrame(
            [("o1", "w1", "b"), ("o1", "w2", "b")], columns=["object", "worker", "value"]
        )
        assert vote(SIMPLE, answers).truth_map()["o1"] == "b"


class TestCRH:
    def test_simple_consensus(self):
        assert crh(SIMPLE).truth_map() == {"o1": "a", "o2": "x", "o3": "p"}

    def test_reliable_source_gets_weight(self, ds, gold):
        res = crh(ds.records)
        assert M.accuracy(res.truths, gold) > M.accuracy(vote(ds.records).truths, gold) - 0.1

    def test_numeric_converges(self):
        recs = pd.DataFrame(
            [("o1", "s1", "10.0"), ("o1", "s2", "10.1"), ("o1", "s3", "200.0")],
            columns=["object", "source", "value"],
        )
        t = crh_numeric(recs).truth_map()["o1"]
        assert 9 < float(t) < 80  # pulled toward the cluster, not the outlier


class TestAccu:
    def test_consensus(self):
        assert accu(SIMPLE, detect_dependence=False).truth_map()["o3"] == "p"

    def test_popaccu_consensus(self):
        assert popaccu(SIMPLE, detect_dependence=False).truth_map()["o3"] == "p"

    def test_accuracy_estimates_exposed(self):
        res = accu(SIMPLE)
        assert set(res.extras["accuracy"].index) == {"s1", "s2", "s3"}
        assert ((res.extras["accuracy"] > 0) & (res.extras["accuracy"] < 1)).all()

    def test_copier_detected(self):
        """A source that always copies another (including its mistakes)
        should yield a high pairwise dependence probability."""
        rows = []
        for i in range(12):
            o = f"o{i}"
            good = "v" if i % 3 else "wrong"
            rows += [
                (o, "orig", good),
                (o, "copy", good),
                (o, "indep1", "v"),
                (o, "indep2", "v"),
                (o, "indep3", "v"),
            ]
        recs = pd.DataFrame(rows, columns=["object", "source", "value"])
        res = accu(recs)
        dep = res.extras["dependence"]
        assert dep.get(("copy", "orig"), 0.0) > 0.5
        # independents sharing only true values stay independent
        assert dep.get(("indep1", "indep2"), 0.0) < 0.5

    def test_worker_accuracy_reported(self):
        answers = pd.DataFrame(
            [("o1", "w1", "a"), ("o2", "w1", "x")], columns=["object", "worker", "value"]
        )
        res = accu(SIMPLE, answers)
        assert list(res.worker_accuracy["worker"]) == ["w1"]


class TestLCA:
    def test_consensus(self):
        assert lca(SIMPLE).truth_map()["o3"] == "p"

    def test_honesty_in_range(self):
        res = lca(SIMPLE)
        h = res.extras["honesty"]["honesty"]
        assert ((h >= 0.01) & (h <= 0.99)).all()

    def test_mu_normalized(self, ds):
        res = lca(ds.records)
        assert np.allclose(res.mu.groupby("object")["mu"].sum(), 1.0)


class TestLFC:
    def test_consensus(self):
        assert lfc(SIMPLE).truth_map()["o3"] == "p"

    def test_multi_truth_includes_argmax(self):
        out = lfc_mt(SIMPLE, threshold=0.99)
        assert all(len(v) >= 1 for v in out.values())

    def test_multi_truth_threshold_widens_sets(self):
        tight = lfc_mt(SIMPLE, threshold=0.9)
        loose = lfc_mt(SIMPLE, threshold=0.05)
        assert sum(map(len, loose.values())) >= sum(map(len, tight.values()))


class TestMDC:
    def test_consensus(self):
        assert mdc(SIMPLE).truth_map()["o3"] == "p"

    def test_runs_on_real_data(self, ds, gold):
        res = mdc(ds.records)
        assert M.accuracy(res.truths, gold) > 0.5


class TestDOCS:
    def test_domains_are_top_level(self, ds):
        doms = object_domains(ds.records, ds.hierarchy)
        for d in doms.values():
            assert d == "_other" or ds.hierarchy.depth(d) == 1

    def test_consensus(self, ds, gold):
        res = docs(ds.records, hierarchy=ds.hierarchy)
        assert M.accuracy(res.truths, gold) > 0.5

    def test_domain_quality_exposed(self, ds):
        res = docs(ds.records, hierarchy=ds.hierarchy)
        assert len(res.extras["domain_quality"]) > 0


class TestASUMS:
    def test_requires_hierarchy_or_depths(self, anc):
        with pytest.raises(ValueError):
            asums(SIMPLE, anc_pairs=anc.iloc[:0])

    def test_consensus(self, ds, anc, gold):
        res = asums(ds.records, anc_pairs=anc, hierarchy=ds.hierarchy)
        assert M.accuracy(res.truths, gold) > 0.4

    def test_threshold_controls_granularity(self, ds, anc):
        """Lower threshold → more specific (deeper) estimates on average."""
        deep = asums(ds.records, anc_pairs=anc, hierarchy=ds.hierarchy, threshold=0.2)
        shallow = asums(ds.records, anc_pairs=anc, hierarchy=ds.hierarchy, threshold=0.95)
        d_deep = np.mean([ds.hierarchy.depth(v) for v in deep.truths["value"]])
        d_shallow = np.mean([ds.hierarchy.depth(v) for v in shallow.truths["value"]])
        assert d_deep >= d_shallow


class TestMultiTruth:
    def test_ltm_outputs_nonempty_sets(self, ds):
        out = ltm(ds.records, n_sweeps=20, burn_in=5)
        assert set(out) == set(ds.records["object"].unique())
        assert all(len(v) >= 1 for v in out.values())

    def test_ltm_deterministic_given_seed(self, ds):
        a = ltm(ds.records, n_sweeps=10, burn_in=2, seed=1)
        b = ltm(ds.records, n_sweeps=10, burn_in=2, seed=1)
        assert a == b

    def test_dart_high_recall(self, ds, gold):
        out = M.expand_prediction_sets(
            dart(ds.records, hierarchy=ds.hierarchy), ds.hierarchy
        )
        _, recall, _ = M.multi_truth_prf(out, gold, ds.hierarchy)
        assert recall > 0.5

    def test_dart_all_objects_covered(self, ds):
        out = dart(ds.records, hierarchy=ds.hierarchy)
        assert set(out) == set(ds.records["object"].unique())


class TestNumericBaselines:
    def test_chi2_quantile_accuracy(self):
        # reference values from scipy.stats.chi2.ppf(0.025, df)
        assert chi2_quantile(-1.96, 10) == pytest.approx(3.247, rel=0.05)
        assert chi2_quantile(-1.96, 50) == pytest.approx(32.357, rel=0.02)

    def test_mean(self):
        recs = pd.DataFrame(
            [("o1", "s1", "1.0"), ("o1", "s2", "3.0")], columns=["object", "source", "value"]
        )
        assert mean_baseline(recs).truth_map()["o1"] == pytest.approx(2.0)

    def test_catd_downweights_outlier_source(self):
        rows = []
        for i in range(10):
            rows += [
                (f"o{i}", "good1", "10.0"),
                (f"o{i}", "good2", "10.0"),
                (f"o{i}", "bad", "1000.0"),
            ]
        recs = pd.DataFrame(rows, columns=["object", "source", "value"])
        est = catd(recs).truth_map()["o0"]
        assert abs(est - 10.0) < 5.0
