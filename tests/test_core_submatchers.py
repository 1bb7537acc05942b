"""Sub-matcher window expansion (§IV-B1)."""
import pandas as pd
import pytest

from repro.core.submatchers import (
    expand_submatchers,
    is_sub,
    parent_of,
    spec_of,
    submatcher_sizes,
)
from repro.humansim import build_cohort


class TestIdHelpers:
    def test_spec_sizes(self):
        assert submatcher_sizes("none") == []
        assert submatcher_sizes("50") == [50]
        assert submatcher_sizes("70") == [30, 40, 50, 60, 70]

    def test_unknown_spec_raises(self):
        with pytest.raises(ValueError):
            submatcher_sizes("99")

    def test_parent_and_spec(self):
        assert parent_of("po_001#w50#25") == "po_001"
        assert spec_of("po_001#w50#25") == 50
        assert parent_of("po_001") == "po_001"
        assert spec_of("po_001") is None
        assert is_sub("po_001#w30#0") and not is_sub("po_001")


@pytest.fixture(scope="module")
def expanded(spark):
    c = build_cohort("PO", n_matchers=6, seed=1)
    dec = spark.createDataFrame(c.decisions)
    mouse = spark.createDataFrame(c.mouse)
    sub_dec, sub_mouse = expand_submatchers(spark, dec, mouse, sizes=[20])
    return c, sub_dec.toPandas(), sub_mouse.toPandas()


class TestExpansion:
    def test_window_sizes_exact(self, expanded):
        _, sub_dec, _ = expanded
        counts = sub_dec.groupby("matcher_id").size()
        assert (counts == 20).all()

    def test_ids_are_virtual(self, expanded):
        _, sub_dec, _ = expanded
        assert sub_dec["matcher_id"].map(is_sub).all()
        assert sub_dec["matcher_id"].map(spec_of).eq(20).all()

    def test_windows_are_consecutive(self, expanded):
        """Each window's decisions are a contiguous slice of the parent
        history (by timestamp order)."""
        c, sub_dec, _ = expanded
        for sid, g in sub_dec.groupby("matcher_id"):
            parent = parent_of(sid)
            pg = c.decisions[c.decisions.matcher_id == parent].sort_values(["t", "step"])
            start = int(sid.split("#")[2])
            expected = pg.iloc[start : start + 20]
            got = g.sort_values(["t", "step"])
            assert got["t"].tolist() == expected["t"].tolist()

    def test_stride_is_half_window(self, expanded):
        c, sub_dec, _ = expanded
        starts = sorted(
            {int(s.split("#")[2]) for s in sub_dec["matcher_id"].unique()
             if parent_of(s) == c.matcher_ids[0]}
        )
        assert all(s % 10 == 0 for s in starts)

    def test_mouse_within_decision_span(self, expanded):
        _, sub_dec, sub_mouse = expanded
        spans = sub_dec.groupby("matcher_id")["t"].agg(["min", "max"])
        for sid, g in sub_mouse.groupby("matcher_id"):
            lo, hi = spans.loc[sid]
            assert g["t"].between(lo, hi).all()

    def test_empty_sizes_empty_frames(self, spark):
        c = build_cohort("PO", n_matchers=2, seed=0)
        dec = spark.createDataFrame(c.decisions)
        mouse = spark.createDataFrame(c.mouse)
        sub_dec, sub_mouse = expand_submatchers(spark, dec, mouse, sizes=[])
        assert sub_dec.count() == 0 and sub_mouse.count() == 0

    def test_oversized_window_skipped(self, spark):
        c = build_cohort("PO", n_matchers=3, seed=2)
        dec = spark.createDataFrame(c.decisions)
        mouse = spark.createDataFrame(c.mouse)
        sub_dec, _ = expand_submatchers(spark, dec, mouse, sizes=[10_000])
        assert sub_dec.count() == 0

    def test_multiple_sizes(self, spark):
        c = build_cohort("PO", n_matchers=3, seed=3)
        dec = spark.createDataFrame(c.decisions)
        mouse = spark.createDataFrame(c.mouse)
        sub_dec, _ = expand_submatchers(spark, dec, mouse, sizes=[10, 20])
        sizes = {spec_of(m) for m in sub_dec.toPandas()["matcher_id"].unique()}
        assert sizes == {10, 20}
