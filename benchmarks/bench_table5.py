"""Benchmark for Table 5: multi-truth algorithms at SF=0.1."""
import pytest

from repro.baselines.lfc import lfc_mt
from repro.baselines.multitruth import dart, ltm
from repro.datagen.truthdata import heritages_lite


@pytest.fixture(scope="module")
def ds():
    return heritages_lite(sf=0.1, seed=1)


def test_ltm_gibbs(benchmark, ds):
    out = benchmark.pedantic(
        lambda: ltm(ds.records, n_sweeps=40, burn_in=15), rounds=2, iterations=1
    )
    assert len(out) > 0


def test_dart(benchmark, ds):
    out = benchmark.pedantic(
        lambda: dart(ds.records, hierarchy=ds.hierarchy), rounds=2, iterations=1
    )
    assert len(out) > 0


def test_lfc_mt(benchmark, ds):
    out = benchmark.pedantic(lambda: lfc_mt(ds.records), rounds=2, iterations=1)
    assert len(out) > 0
