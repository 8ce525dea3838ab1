"""Zone-map simulator: block skipping for sketch predicates (Sec. 8)."""
import numpy as np
import pandas as pd
import pytest

from repro.core.ranges import equi_depth
from repro.core.sketch import ProvenanceSketch
from repro.physical.zonemap import ZoneMap, Zone, build_zone_map


class TestBuild:
    def test_block_count(self):
        zm = build_zone_map(pd.Series(range(100)), "a", 10)
        assert len(zm.zones) == 10 and zm.n_rows == 100

    def test_ragged_last_block(self):
        zm = build_zone_map(pd.Series(range(95)), "a", 10)
        assert zm.zones[-1].rows == 5

    def test_min_max_per_block(self):
        zm = build_zone_map(pd.Series([3, 1, 2, 9, 8, 7]), "a", 3)
        assert (zm.zones[0].lo, zm.zones[0].hi) == (1, 3)
        assert (zm.zones[1].lo, zm.zones[1].hi) == (7, 9)

    def test_clustered_sorts_first(self):
        zm = build_zone_map(pd.Series([9, 1, 8, 2, 7, 3]), "a", 2, clustered=True)
        assert zm.zones[0].hi <= zm.zones[1].lo


class TestScan:
    ZM = ZoneMap("a", (Zone(0, 9, 10), Zone(10, 19, 10), Zone(20, 29, 10)))

    def test_single_range_hits_one_block(self):
        rep = self.ZM.scan([(9, 15)])  # (9, 15]: block 1 only... block0 hi=9 > lo=9? no
        assert rep.blocks_read == 1 and rep.rows_read == 10

    def test_unbounded_low(self):
        rep = self.ZM.scan([(None, 5)])
        assert rep.blocks_read == 1

    def test_unbounded_high(self):
        rep = self.ZM.scan([(15, None)])
        assert rep.blocks_read == 2

    def test_disjunction(self):
        rep = self.ZM.scan([(None, 5), (25, None)])
        assert rep.blocks_read == 2

    def test_no_match(self):
        rep = self.ZM.scan([(100, 200)])
        assert rep.blocks_read == 0 and rep.row_fraction == 0.0

    def test_fractions(self):
        rep = self.ZM.scan([(None, None)])
        assert rep.block_fraction == 1.0 and rep.row_fraction == 1.0


class TestPhysicalClaim:
    """The paper's core physical claim: a sketch's selectivity is only
    realizable as I/O skipping when physical design (clustering /
    zone maps) aligns with the sketch attribute."""

    def _sketch_ranges(self, values, n_frag, frags):
        part = equi_depth(values, "r", "a", n_frag)
        sk = ProvenanceSketch(part, frozenset(f for f in frags if f < part.n_fragments))
        return part.merged_ranges(sk.fragments), sk

    def test_clustered_skips_proportionally(self):
        g = np.random.default_rng(0)
        vals = pd.Series(g.integers(0, 100_000, 20_000))
        ranges, sk = self._sketch_ranges(vals, 20, {3})
        zm = build_zone_map(vals, "a", 500, clustered=True)
        rep = zm.scan(ranges)
        assert rep.row_fraction < 0.15  # ~1/20 of the data + block edges

    def test_random_order_cannot_skip(self):
        g = np.random.default_rng(0)
        vals = pd.Series(g.integers(0, 100_000, 20_000))
        ranges, sk = self._sketch_ranges(vals, 20, {3})
        zm = build_zone_map(vals, "a", 500, clustered=False)
        rep = zm.scan(ranges)
        assert rep.row_fraction > 0.95  # every block overlaps the range

    def test_adjacent_merge_reduces_ranges_not_rows(self):
        g = np.random.default_rng(1)
        vals = pd.Series(g.integers(0, 100_000, 10_000))
        part = equi_depth(vals, "r", "a", 16)
        sk = ProvenanceSketch(part, frozenset({2, 3, 4, 9}))
        merged = part.merged_ranges(sk.fragments)
        assert len(merged) == 2  # {2,3,4} coalesce + {9}
        zm = build_zone_map(vals, "a", 250, clustered=True)
        merged_rows = zm.scan(merged).rows_read
        unmerged = [part.bounds(f) for f in sorted(sk.fragments)]
        assert zm.scan(unmerged).rows_read == merged_rows
