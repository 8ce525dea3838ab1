"""Zone-map (block min/max) simulator.

A zone map divides a table, in storage order, into fixed-size blocks
and keeps min/max per block. A conjunction/disjunction of range
predicates can skip every block whose [min, max] does not intersect
any predicate range — precisely how Postgres BRIN indexes and Oracle
zone maps serve the conditions PBDS generates (paper Sec. 8.1).

The simulator makes skipping *measurable and deterministic*: given a
sketch's merged ranges it reports how many blocks (and rows) a scan
must touch. Tests use it to show the paper's central physical claim:
with data clustered on the sketch attribute, the scanned fraction
tracks sketch selectivity; with random storage order it does not.
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import Optional, Sequence

import numpy as np
import pandas as pd


@dataclass(frozen=True)
class Zone:
    lo: object
    hi: object
    rows: int


@dataclass(frozen=True)
class ZoneMap:
    attr: str
    zones: tuple[Zone, ...]

    @property
    def n_rows(self) -> int:
        return sum(z.rows for z in self.zones)

    def scan(
        self, ranges: Sequence[tuple[Optional[object], Optional[object]]]
    ) -> "ScanReport":
        """Which blocks must be read for a disjunction of (lo, hi]
        ranges (None = unbounded side)?"""
        read = []
        for i, z in enumerate(self.zones):
            hit = False
            for lo, hi in ranges:
                lo_ok = lo is None or z.hi > lo
                hi_ok = hi is None or z.lo <= hi
                if lo_ok and hi_ok:
                    hit = True
                    break
            if hit:
                read.append(i)
        rows = sum(self.zones[i].rows for i in read)
        return ScanReport(
            blocks_total=len(self.zones),
            blocks_read=len(read),
            rows_total=self.n_rows,
            rows_read=rows,
        )


@dataclass(frozen=True)
class ScanReport:
    blocks_total: int
    blocks_read: int
    rows_total: int
    rows_read: int

    @property
    def block_fraction(self) -> float:
        return self.blocks_read / self.blocks_total if self.blocks_total else 0.0

    @property
    def row_fraction(self) -> float:
        return self.rows_read / self.rows_total if self.rows_total else 0.0


def build_zone_map(
    values: pd.Series, attr: str, block_rows: int, *, clustered: bool = False
) -> ZoneMap:
    """Zone map over ``values`` in storage order (optionally after
    clustering, i.e. sorting, on the attribute)."""
    v = values.reset_index(drop=True)
    if clustered:
        v = v.sort_values(kind="stable").reset_index(drop=True)
    zones = []
    arr = v.to_numpy()
    for start in range(0, len(arr), block_rows):
        chunk = arr[start : start + block_rows]
        zones.append(Zone(lo=chunk.min(), hi=chunk.max(), rows=len(chunk)))
    return ZoneMap(attr, tuple(zones))
