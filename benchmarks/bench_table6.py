"""Benchmark for Table 6: numeric TDH over the implied rounding hierarchy."""
import pytest

from repro.baselines.numeric import catd
from repro.core.candidates import candidate_sets, numeric_ancestor_pairs_df
from repro.core.tdh_local import TDH
from repro.datagen.stock import stock_lite


@pytest.fixture(scope="module")
def ds():
    return stock_lite("eps", sf=0.1, seed=7)


def test_numeric_hierarchy_construction(benchmark, ds):
    cand = candidate_sets(ds.records)
    anc = benchmark.pedantic(
        lambda: numeric_ancestor_pairs_df(cand), rounds=3, iterations=1
    )
    assert len(anc) > 0


def test_tdh_numeric_inference(benchmark, ds):
    cand = candidate_sets(ds.records)
    anc = numeric_ancestor_pairs_df(cand)
    res = benchmark.pedantic(
        lambda: TDH(max_iter=60).fit(ds.records, None, anc), rounds=2, iterations=1
    )
    assert len(res.truths) == ds.records["object"].nunique()


def test_catd_numeric(benchmark, ds):
    res = benchmark.pedantic(lambda: catd(ds.records), rounds=3, iterations=1)
    assert len(res.truths) > 0
