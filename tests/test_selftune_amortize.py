"""Amortization model behind Fig. 14 and SketchStore bookkeeping."""
import pytest

from repro.core.selftune import SketchStore, amortization_table
from repro.physical.stats import table_stats_pandas
from repro.workloads import crimes as WC


class TestAmortizationTable:
    def test_no_ps_wins_forever_when_cheapest(self):
        rows = amortization_table(1.0, {"PS": (10.0, 2.0)})
        assert rows == [("No-PS", 1, None)]

    def test_crossover(self):
        # No-PS costs 10/run; sketch: 30 to capture, 1/run.
        # n*10 vs 30+n -> crossover at n=4 (40 vs 34)
        rows = amortization_table(10.0, {"PS": (30.0, 1.0)})
        assert rows[0][0] == "No-PS" and rows[0][1] == 1
        assert rows[-1] == ("PS", 4, None)

    def test_immediate_win(self):
        # paper: sketch often amortizes after one or two runs
        rows = amortization_table(10.0, {"PS4000": (5.0, 0.1)})
        assert rows == [("PS4000", 1, None)]

    def test_three_way(self):
        # mid option wins a middle interval, like PS10000 in Fig. 14
        rows = amortization_table(
            10.0, {"PSmid": (15.0, 3.0), "PSfine": (100.0, 0.5)}
        )
        labels = [r[0] for r in rows]
        assert labels[0] == "No-PS" and labels[-1] == "PSfine"
        assert "PSmid" in labels
        # intervals tile [1, inf)
        for (l1, s1, e1), (l2, s2, e2) in zip(rows, rows[1:]):
            assert e1 == s2
        assert rows[-1][2] is None

    def test_dominated_option_never_listed(self):
        rows = amortization_table(
            10.0, {"PSbad": (50.0, 20.0), "PSgood": (5.0, 1.0)}
        )
        assert all(r[0] != "PSbad" for r in rows)


class TestSketchStore:
    def _mk(self):
        stats = table_stats_pandas(WC.tables_pandas(sf=0.0003))
        return SketchStore(stats), stats

    def test_find_reusable_threshold(self):
        store, stats = self._mk()
        store.add("C-Q2", WC.cq2(50), {})
        assert store.find("C-Q2", WC.cq2(80)) is not None
        assert store.find("C-Q2", WC.cq2(20)) is None

    def test_template_isolation(self):
        store, _ = self._mk()
        store.add("C-Q2", WC.cq2(50), {})
        assert store.find("other", WC.cq2(80)) is None

    def test_reuse_check_counter(self):
        store, _ = self._mk()
        store.add("C-Q2", WC.cq2(50), {})
        store.find("C-Q2", WC.cq2(80))
        assert store.reuse_checks == 1

    def test_coverage_defaults_high_without_sketches(self):
        store, _ = self._mk()
        store.add("C-Q2", WC.cq2(50), {})
        assert store.entries[0].coverage == 1.0
