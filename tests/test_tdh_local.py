"""Tests for the TDH EM reference engine (model math of §3)."""
import numpy as np
import pandas as pd
import pytest

from repro.core.candidates import candidate_sets, hierarchical_ancestor_pairs
from repro.core.tdh_local import TDH, _prepare
from repro.datagen.truthdata import birthplaces_lite
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
            "Manchester": "UK",
        }
    )


def _records(rows):
    return pd.DataFrame(rows, columns=["object", "source", "value"])


def _fit(records, h, answers=None, **kw):
    cand = candidate_sets(records)
    anc = hierarchical_ancestor_pairs(cand, h)
    return TDH(**kw).fit(records, answers, anc)


class TestStatueOfLiberty:
    """The paper's running example (Table 1)."""

    def test_hierarchy_resolves_generalized_conflict(self, h):
        # UNESCO says NY, Wikipedia says Liberty Island, Arrangy says LA;
        # supporting sources elsewhere establish reliabilities.
        rows = [
            ("statue", "unesco", "NY"),
            ("statue", "wikipedia", "LibertyIsland"),
            ("statue", "arrangy", "LA"),
            ("bigben", "quora", "Manchester"),
            ("bigben", "tripadvisor", "London"),
            # extra corroborating objects so EM can tell sources apart
            ("o1", "unesco", "USA"),
            ("o1", "wikipedia", "NY"),
            ("o1", "tripadvisor", "NY"),
            ("o2", "wikipedia", "London"),
            ("o2", "tripadvisor", "London"),
            ("o2", "arrangy", "LA"),
            ("o3", "wikipedia", "LA"),
            ("o3", "unesco", "LA"),
            ("o3", "arrangy", "UK"),
        ]
        res = _fit(_records(rows), h)
        # NY and LibertyIsland do not conflict; the most specific wins
        assert res.truth_map()["statue"] == "LibertyIsland"

    def test_confidences_sum_to_one(self, h):
        rows = [
            ("statue", "unesco", "NY"),
            ("statue", "wikipedia", "LibertyIsland"),
            ("statue", "arrangy", "LA"),
        ]
        res = _fit(_records(rows), h)
        sums = res.mu.groupby("object")["mu"].sum()
        assert np.allclose(sums, 1.0)


class TestEMInvariants:
    @pytest.fixture(scope="class")
    def ds(self):
        return birthplaces_lite(sf=0.02, seed=0)

    @pytest.fixture(scope="class")
    def res(self, ds):
        cand = candidate_sets(ds.records)
        anc = hierarchical_ancestor_pairs(cand, ds.hierarchy)
        return TDH().fit(ds.records, None, anc)

    def test_mu_is_distribution(self, res):
        assert np.allclose(res.mu.groupby("object")["mu"].sum(), 1.0)
        assert (res.mu["mu"] >= 0).all()

    def test_phi_is_distribution(self, res):
        assert np.allclose(res.phi[["phi1", "phi2", "phi3"]].sum(axis=1), 1.0)
        assert (res.phi[["phi1", "phi2", "phi3"]].to_numpy() >= 0).all()

    def test_truths_are_candidates(self, ds, res):
        cand = set(map(tuple, candidate_sets(ds.records).to_numpy()))
        assert all((o, v) in cand for o, v in res.truths.to_numpy())

    def test_every_object_gets_truth(self, ds, res):
        assert set(res.truths["object"]) == set(ds.records["object"].unique())

    def test_N_D_consistent_with_mu(self, res):
        """Eq. (9): mu = N/D at convergence (within EM tolerance)."""
        m = res.mu.merge(res.N, on=["object", "value"]).merge(res.D, on="object")
        assert np.allclose(m["mu"], m["N"] / m["D"], atol=1e-4)

    def test_D_formula(self, ds, res):
        """D_o = |S_o| + |W_o| + |V_o| for gamma=2 (no answers here)."""
        s = ds.records.groupby("object").size()
        nv = candidate_sets(ds.records).groupby("object").size()
        d = res.D.set_index("object")["D"]
        for o in s.index:
            assert d[o] == pytest.approx(s[o] + nv[o])

    def test_deterministic(self, ds):
        cand = candidate_sets(ds.records)
        anc = hierarchical_ancestor_pairs(cand, ds.hierarchy)
        r1 = TDH().fit(ds.records, None, anc)
        r2 = TDH().fit(ds.records, None, anc)
        pd.testing.assert_frame_equal(r1.mu, r2.mu)

    def test_convergence_flag(self, ds, res):
        assert 1 <= res.extras["n_iter"] <= 100

    def test_beats_majority_vote(self, ds, res):
        from repro.baselines.vote import vote

        cand = candidate_sets(ds.records)
        gold = M.map_gold_to_candidates(ds.gold, cand, ds.hierarchy)
        assert M.accuracy(res.truths, gold) >= M.accuracy(vote(ds.records).truths, gold)


class TestWorkerSide:
    def test_answers_change_mu(self, h):
        rows = [
            ("o1", "s1", "NY"),
            ("o1", "s2", "LA"),
            ("o2", "s1", "London"),
            ("o2", "s2", "London"),
            ("o2", "s3", "UK"),
        ]
        recs = _records(rows)
        answers = pd.DataFrame(
            [("o1", "w1", "LA"), ("o1", "w2", "LA"), ("o1", "w3", "LA")],
            columns=["object", "worker", "value"],
        )
        r_no = _fit(recs, h)
        r_yes = _fit(recs, h, answers=answers)
        mu_no = r_no.mu_map()["o1"]["LA"]
        mu_yes = r_yes.mu_map()["o1"]["LA"]
        assert mu_yes > mu_no
        assert r_yes.truth_map()["o1"] == "LA"

    def test_psi_reported_per_worker(self, h):
        recs = _records([("o1", "s1", "NY"), ("o1", "s2", "LA")])
        answers = pd.DataFrame(
            [("o1", "w1", "NY")], columns=["object", "worker", "value"]
        )
        res = _fit(recs, h, answers=answers)
        assert list(res.psi["worker"]) == ["w1"]
        assert np.allclose(res.psi[["psi1", "psi2", "psi3"]].sum(axis=1), 1.0)

    def test_answer_outside_candidates_rejected(self, h):
        recs = _records([("o1", "s1", "NY"), ("o1", "s2", "LA")])
        answers = pd.DataFrame(
            [("o1", "w1", "London")], columns=["object", "worker", "value"]
        )
        with pytest.raises(ValueError, match="not a candidate"):
            _fit(recs, h, answers=answers)

    def test_duplicate_answer_rejected(self, h):
        recs = _records([("o1", "s1", "NY"), ("o1", "s2", "LA")])
        answers = pd.DataFrame(
            [("o1", "w1", "NY"), ("o1", "w1", "LA")],
            columns=["object", "worker", "value"],
        )
        with pytest.raises(ValueError, match="at most one"):
            _fit(recs, h, answers=answers)


class TestModelStructure:
    def test_duplicate_record_rejected(self, h):
        recs = _records([("o1", "s1", "NY"), ("o1", "s1", "LA")])
        with pytest.raises(ValueError, match="at most one claim"):
            _fit(recs, h)

    def test_generalization_detected(self, h):
        """A source that always claims the parent of the consensus value
        should get high phi2, not low phi1+high phi3."""
        rows = []
        cities = ["NY", "LA", "London", "Manchester"]
        parents = {"NY": "USA", "LA": "USA", "London": "UK", "Manchester": "UK"}
        for i, c in enumerate(cities * 3):
            o = f"o{i}"
            rows += [
                (o, "exact1", c),
                (o, "exact2", c),
                (o, "generalizer", parents[c]),
            ]
        res = _fit(_records(rows), h)
        phi = res.phi.set_index("source")
        assert phi.loc["generalizer", "phi2"] > phi.loc["generalizer", "phi3"]
        assert phi.loc["generalizer", "phi2"] > phi.loc["exact1", "phi2"]
        assert phi.loc["exact1", "phi1"] > phi.loc["generalizer", "phi1"]

    def test_flat_objects_use_collapsed_model(self, h):
        """Objects without ancestor pairs (o ∉ O_H) still infer fine and
        split credit between phi1 and phi2 (Eq. 2)."""
        rows = [
            ("o1", "s1", "NY"), ("o1", "s2", "NY"), ("o1", "s3", "LA"),
            ("o2", "s1", "London"), ("o2", "s2", "London"), ("o2", "s3", "London"),
        ]
        res = _fit(_records(rows), h)
        assert res.truth_map() == {"o1": "NY", "o2": "London"}

    def test_single_candidate_object(self, h):
        rows = [("o1", "s1", "NY"), ("o1", "s2", "NY")]
        res = _fit(_records(rows), h)
        assert res.truth_map()["o1"] == "NY"
        assert res.mu_map()["o1"]["NY"] == pytest.approx(1.0)

    def test_prepare_marks_oh_objects(self, h):
        recs = _records(
            [("o1", "s1", "NY"), ("o1", "s2", "USA"), ("o2", "s1", "LA"), ("o2", "s2", "London")]
        )
        cand = candidate_sets(recs)
        anc = hierarchical_ancestor_pairs(cand, h)
        p = _prepare(recs, None, anc)
        objs = p["objects"]
        assert bool(p["oh"][objs.index("o1")]) is True
        assert bool(p["oh"][objs.index("o2")]) is False

    def test_object_info_in_extras(self, h):
        recs = _records([("o1", "s1", "NY"), ("o1", "s2", "USA")])
        res = _fit(recs, h)
        info = res.extras["object_info"]
        assert info["o1"]["oh"] is True
        assert info["o1"]["S"] == 2.0
        assert set(info["o1"]["values"]) == {"NY", "USA"}


class TestPriors:
    def test_alpha_prior_shapes_phi_with_no_data_signal(self, h):
        # single object, single source: phi should stay near prior mean
        res = _fit(_records([("o1", "s1", "NY")]), h, max_iter=5)
        phi = res.phi.iloc[0]
        assert phi["phi1"] + phi["phi2"] > phi["phi3"]

    def test_custom_gamma_changes_smoothing(self, h):
        recs = _records([("o1", "s1", "NY"), ("o1", "s2", "LA"), ("o1", "s3", "LA")])
        strong = _fit(recs, h, gamma=5.0).mu_map()["o1"]["LA"]
        weak = _fit(recs, h, gamma=2.0).mu_map()["o1"]["LA"]
        assert strong < weak  # heavier prior pulls toward uniform
