"""Unit tests for event-time attribute / watermark-alignment tracking
(Extension 1 metadata; Section 5 lessons)."""
import pytest

from repro.core.schema import EventTimeSchema


def bid_schema() -> EventTimeSchema:
    return EventTimeSchema.of(["bidtime", "price", "item"], ["bidtime"])


class TestConstruction:
    def test_of(self):
        s = bid_schema()
        assert s.columns == ("bidtime", "price", "item")
        assert s.is_aligned("bidtime")
        assert not s.is_aligned("price")

    def test_event_time_col_must_exist(self):
        with pytest.raises(ValueError, match="not in schema"):
            EventTimeSchema.of(["a"], ["b"])


class TestProjection:
    def test_verbatim_forwarding_preserves_alignment(self):
        s = bid_schema().project({"bidtime": "bidtime", "price": "price"})
        assert s.is_aligned("bidtime")

    def test_rename_preserves_alignment(self):
        s = bid_schema().project({"when": "bidtime"})
        assert s.is_aligned("when")

    def test_arbitrary_expression_erases_alignment(self):
        # Lesson from §5: "operators may erase watermark alignment" — an
        # expression over the timestamp is no longer watermark-aligned.
        s = bid_schema().project({"rounded": "date_trunc('hour', bidtime)"})
        assert not s.is_aligned("rounded")

    def test_projecting_away_event_time(self):
        s = bid_schema().project({"price": "price"})
        assert s.event_time_cols == frozenset()

    def test_non_event_column_stays_plain(self):
        s = bid_schema().project({"price": "price"})
        assert not s.is_aligned("price")


class TestShift:
    def test_constant_shift_preserves_alignment(self):
        s = bid_schema().shift("bidtime", "bidtime_plus_1h")
        assert s.is_aligned("bidtime_plus_1h")
        assert s.is_aligned("bidtime")

    def test_shift_of_plain_column_stays_plain(self):
        s = bid_schema().shift("price", "price2")
        assert not s.is_aligned("price2")

    def test_shift_unknown_column(self):
        with pytest.raises(ValueError, match="unknown column"):
            bid_schema().shift("nope")


class TestWindowing:
    def test_window_adds_aligned_bounds(self):
        s = bid_schema().window("bidtime")
        assert s.is_aligned("wstart") and s.is_aligned("wend")
        assert s.is_aligned("bidtime")

    def test_window_requires_alignment(self):
        plain = EventTimeSchema.of(["ts", "v"], [])
        with pytest.raises(ValueError, match="watermark alignment"):
            plain.window("ts")

    def test_window_after_degrade_rejected(self):
        s = bid_schema().degrade("bidtime")
        with pytest.raises(ValueError):
            s.window("bidtime")


class TestJoin:
    def test_join_keeps_both_event_times(self):
        # Lesson from §5: "TVRs might have more than one event time
        # attribute" — both stay watermarked (watermark held back to min).
        orders = EventTimeSchema.of(["otime", "oid"], ["otime"])
        joined = bid_schema().join(orders)
        assert joined.is_aligned("bidtime") and joined.is_aligned("otime")
        assert len(joined.event_time_cols) == 2

    def test_join_requires_disjoint_columns(self):
        with pytest.raises(ValueError, match="disjoint"):
            bid_schema().join(bid_schema())


class TestDegrade:
    def test_degrade_erases(self):
        s = bid_schema().degrade("bidtime")
        assert not s.is_aligned("bidtime")
        assert "bidtime" in s.columns

    def test_degrade_is_idempotent(self):
        s = bid_schema().degrade("bidtime").degrade("bidtime")
        assert not s.is_aligned("bidtime")
