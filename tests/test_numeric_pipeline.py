"""End-to-end shape tests for the Table 6 numeric pipeline (§3.2, §5.8)."""
import pandas as pd
import pytest

from repro.baselines.crh import crh_numeric
from repro.baselines.numeric import catd, mean_baseline
from repro.core.candidates import candidate_sets, numeric_ancestor_pairs_df
from repro.core.tdh_local import TDH
from repro.datagen.stock import stock_lite
from repro.eval.metrics import mae_re
from repro.tables.table6 import table6


@pytest.fixture(scope="module")
def eps():
    return stock_lite("eps", sf=0.05, seed=7)


def _mae(res, gold):
    t = res.truths.copy()
    t["value"] = t["value"].astype(float)
    return mae_re(t, gold)[0]


class TestNumericShape:
    def test_tdh_resolves_rounded_chain_to_small_error(self):
        """Sources report the same truth at different precisions. The
        estimate must stay inside the rounding chain (tiny numeric
        error), and the EM must attribute the aggressive rounder a high
        generalization tendency phi2 (§3.2)."""
        truths = ["605.196", "12.341", "7.773", "81.425", "3.149", "55.501"]
        rows = []
        for i, t in enumerate(truths):
            f = float(t)
            rows += [
                (f"o{i}", "s_full", t),
                (f"o{i}", "s_full2", t),
                (f"o{i}", "s_1dp", f"{f:.1f}"),  # rounds to 1 dp
                (f"o{i}", "s_int", f"{f:.0f}"),  # rounds to integer
            ]
        recs = pd.DataFrame(rows, columns=["object", "source", "value"])
        anc = numeric_ancestor_pairs_df(candidate_sets(recs))
        res = TDH().fit(recs, None, anc)
        tm = res.truth_map()
        for i, t in enumerate(truths):
            # within the chain: at worst the 1-dp rounding (never the
            # integer level, never an unrelated value)
            assert abs(float(tm[f"o{i}"]) - float(t)) <= 0.051
        phi = res.phi.set_index("source")
        assert phi.loc["s_int", "phi2"] > phi.loc["s_full", "phi2"]
        assert phi.loc["s_int", "phi2"] > phi.loc["s_int", "phi3"]

    def test_tdh_robust_to_outliers(self, eps):
        """Candidate selection beats averaging under scale errors."""
        assert _mae(TDH().fit(eps.records, None, numeric_ancestor_pairs_df(candidate_sets(eps.records))), eps.gold) < _mae(mean_baseline(eps.records), eps.gold)

    def test_mean_is_worst_class(self, eps):
        assert _mae(mean_baseline(eps.records), eps.gold) > _mae(catd(eps.records), eps.gold)

    def test_crh_numeric_hurt_by_outliers(self, eps):
        tdh_mae = _mae(
            TDH().fit(eps.records, None, numeric_ancestor_pairs_df(candidate_sets(eps.records))),
            eps.gold,
        )
        assert _mae(crh_numeric(eps.records), eps.gold) > tdh_mae

    def test_table6_shape_tdh_best_or_tied(self):
        df = table6(sf=0.05).set_index("algorithm")
        for attr in ("change_rate", "open_price", "eps"):
            tdh = df.loc["TDH", f"{attr}_mae"]
            assert tdh <= df.loc["MEAN", f"{attr}_mae"]
            assert tdh <= df.loc["CRH", f"{attr}_mae"]
