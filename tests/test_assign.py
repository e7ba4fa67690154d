"""Tests for the task-assignment algorithms (§4)."""
import numpy as np
import pandas as pd
import pytest

from repro.assign.common import (
    AssignContext,
    answer_likelihood,
    onecoin_likelihood_matrix,
    tdh_likelihood_matrix,
)
from repro.assign.eai import eai_assign, eai_quality, u_eai, _ensure_nd_maps
from repro.assign.mb import mb_assign
from repro.assign.me import me_assign
from repro.assign.qasca import qasca_assign
from repro.baselines.vote import vote
from repro.core.candidates import candidate_sets, hierarchical_ancestor_pairs
from repro.core.tdh_local import TDH
from repro.datagen.truthdata import birthplaces_lite


@pytest.fixture(scope="module")
def ds():
    return birthplaces_lite(sf=0.02, seed=0)


@pytest.fixture(scope="module")
def tdh_result(ds):
    cand = candidate_sets(ds.records)
    anc = hierarchical_ancestor_pairs(cand, ds.hierarchy)
    return TDH().fit(ds.records, None, anc)


def make_ctx(result, k=5, answered=None, workers=None, seed=0):
    return AssignContext(
        result=result,
        workers=workers or [f"w{i}" for i in range(4)],
        k=k,
        answered=answered or {},
        rng=np.random.default_rng(seed),
    )


class TestLikelihoodMatrices:
    def test_onecoin_columns_normalized(self):
        A = onecoin_likelihood_matrix(4, 0.8)
        assert np.allclose(A.sum(axis=0), 1.0)
        assert np.allclose(np.diag(A), 0.8)

    def test_onecoin_single_candidate(self):
        assert onecoin_likelihood_matrix(1, 0.8)[0, 0] == 1.0

    def test_tdh_matrix_columns_sum_near_one(self, tdh_result):
        """Eq. (3)/(4) columns sum to 1 whenever every class is reachable."""
        info = next(iter(tdh_result.extras["object_info"].values()))
        psi = np.asarray([0.5, 0.3, 0.2])
        A = tdh_likelihood_matrix(info, psi)
        assert (A >= 0).all()
        assert (A.sum(axis=0) <= 1.0 + 1e-9).all()

    def test_basis_linearity(self, tdh_result):
        ctx = make_ctx(tdh_result)
        o = ctx.objects[0]
        info = ctx.object_info[o]
        psi = np.asarray([0.6, 0.25, 0.15])
        direct = tdh_likelihood_matrix(info, psi)
        B1, B2, B3 = ctx.likelihood_basis(o)
        assert np.allclose(direct, psi[0] * B1 + psi[1] * B2 + psi[2] * B3)

    def test_answer_likelihood_tdh_path(self, tdh_result):
        ctx = make_ctx(tdh_result)
        values, A = answer_likelihood(ctx, "w0", ctx.objects[0])
        assert A.shape == (len(values), len(values))

    def test_answer_likelihood_onecoin_path(self, ds):
        ctx = make_ctx(vote(ds.records))
        values, A = answer_likelihood(ctx, "w0", ctx.objects[0])
        assert np.allclose(np.diag(A), ctx.worker_acc("w0")) or len(values) == 1


class TestEAI:
    def test_upper_bound_holds(self, tdh_result):
        """Lemma 4.1: EAI(w, o) ≤ U_EAI(o) for every pair."""
        ctx = make_ctx(tdh_result)
        _ensure_nd_maps(ctx)
        for o in ctx.objects[:40]:
            u = u_eai(ctx, o)
            for w in ctx.workers:
                assert eai_quality(ctx, w, o) <= u + 1e-12

    def test_single_candidate_zero(self, tdh_result):
        ctx = make_ctx(tdh_result)
        _ensure_nd_maps(ctx)
        singles = [o for o in ctx.objects if len(ctx.object_info[o]["values"]) == 1]
        if not singles:
            pytest.skip("no single-candidate objects at this scale")
        assert eai_quality(ctx, "w0", singles[0]) == 0.0

    def test_assign_respects_k(self, tdh_result):
        ctx = make_ctx(tdh_result, k=3)
        out = eai_assign(ctx)
        assert all(len(v) <= 3 for v in out.values())

    def test_object_assigned_to_one_worker(self, tdh_result):
        ctx = make_ctx(tdh_result, k=5)
        out = eai_assign(ctx)
        allobjs = [o for objs in out.values() for o in objs]
        assert len(allobjs) == len(set(allobjs))

    def test_skips_workers_who_answered(self, tdh_result):
        ctx0 = make_ctx(make_result_copy(tdh_result), k=5)
        baseline = eai_assign(ctx0)
        w0_objs = baseline["w0"]
        if not w0_objs:
            pytest.skip("w0 got no objects")
        answered = {o: {"w0", "w1", "w2", "w3"} for o in w0_objs}
        ctx = make_ctx(make_result_copy(tdh_result), k=5, answered=answered)
        out = eai_assign(ctx)
        for objs in out.values():
            assert not set(objs) & set(w0_objs)

    def test_pruning_matches_unpruned(self, tdh_result):
        a = eai_assign(make_ctx(make_result_copy(tdh_result)), use_pruning=True)
        b = eai_assign(make_ctx(make_result_copy(tdh_result)), use_pruning=False)
        assert a == b

    def test_pruning_reduces_evaluations(self, tdh_result):
        r1 = make_result_copy(tdh_result)
        eai_assign(make_ctx(r1), use_pruning=True)
        pruned = r1.extras["_eai_evals"]
        r2 = make_result_copy(tdh_result)
        eai_assign(make_ctx(r2), use_pruning=False)
        full = r2.extras["_eai_evals"]
        assert pruned <= full

    def test_requires_nd_tables(self, ds):
        ctx = make_ctx(vote(ds.records))
        with pytest.raises(ValueError, match="N/D"):
            eai_assign(ctx)


def make_result_copy(res):
    """Shallow copy with fresh extras (assigners cache maps in extras)."""
    from repro.core.result import InferenceResult

    return InferenceResult(
        truths=res.truths,
        mu=res.mu,
        phi=res.phi,
        psi=res.psi,
        N=res.N,
        D=res.D,
        worker_accuracy=res.worker_accuracy,
        extras={k: v for k, v in res.extras.items() if not k.startswith("_")},
    )


class TestQASCA:
    def test_assign_shape(self, tdh_result):
        out = qasca_assign(make_ctx(make_result_copy(tdh_result), k=4))
        assert all(len(v) <= 4 for v in out.values())
        for objs in out.values():
            assert len(objs) == len(set(objs))  # unique within a worker

    def test_workers_may_share_objects(self, tdh_result):
        """Unlike EAI, QASCA serves each worker independently, so the
        same object can go to several workers in one round."""
        out = qasca_assign(make_ctx(make_result_copy(tdh_result), k=4))
        allobjs = [o for objs in out.values() for o in objs]
        assert len(allobjs) > len(set(allobjs))

    def test_deterministic_given_rng(self, tdh_result):
        a = qasca_assign(make_ctx(make_result_copy(tdh_result), seed=5))
        b = qasca_assign(make_ctx(make_result_copy(tdh_result), seed=5))
        assert a == b

    def test_sampling_sensitivity(self, tdh_result):
        """Different rng seeds can change the assignment (the paper's
        criticism of QASCA)."""
        outs = {
            tuple(sorted((w, tuple(v)) for w, v in qasca_assign(
                make_ctx(make_result_copy(tdh_result), seed=s)
            ).items()))
            for s in range(5)
        }
        assert len(outs) >= 2

    def test_works_with_onecoin_models(self, ds):
        from repro.baselines.lca import lca

        out = qasca_assign(make_ctx(lca(ds.records), k=3))
        assert all(len(v) <= 3 for v in out.values())


class TestMBAndME:
    def test_mb_assign_shape(self, ds):
        from repro.baselines.docs import docs

        res = docs(ds.records, hierarchy=ds.hierarchy)
        out = mb_assign(make_ctx(res, k=4))
        assert all(len(v) <= 4 for v in out.values())

    def test_me_picks_highest_entropy(self, ds):
        res = vote(ds.records)
        ctx = make_ctx(res, k=1, workers=["w0"])
        out = me_assign(ctx)
        ent = {}
        for o, mu in ctx.mu_map.items():
            p = np.asarray(list(mu.values()))
            p = p[p > 0]
            ent[o] = float(-(p * np.log(p)).sum())
        best = max(sorted(ent), key=lambda o: ent[o])
        assert out["w0"] == [max(sorted(ent), key=lambda o: (ent[o], ))] or ent[out["w0"][0]] == pytest.approx(ent[best])

    def test_me_workers_share_top_objects(self, ds):
        """Every worker gets the same most-uncertain objects (no spread)."""
        out = me_assign(make_ctx(vote(ds.records), k=5))
        lists = list(out.values())
        assert all(objs == lists[0] for objs in lists)
