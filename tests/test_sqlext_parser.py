"""Unit tests for the EMIT-clause and interval parsers (§6 syntax)."""
from datetime import timedelta

import pytest

from repro.sqlext.parser import parse_emit_clause, parse_interval, split_emit


class TestParseInterval:
    @pytest.mark.parametrize(
        "text,expected",
        [
            ("INTERVAL '10' MINUTE", timedelta(minutes=10)),
            ("INTERVAL '10' MINUTES", timedelta(minutes=10)),
            ("INTERVAL '6' MINUTE", timedelta(minutes=6)),
            ("INTERVAL '30' SECOND", timedelta(seconds=30)),
            ("INTERVAL '2' HOUR", timedelta(hours=2)),
            ("INTERVAL '1' DAY", timedelta(days=1)),
            ("interval '5' minute", timedelta(minutes=5)),
        ],
    )
    def test_valid(self, text, expected):
        assert parse_interval(text) == expected

    @pytest.mark.parametrize(
        "text",
        [
            "INTERVAL 10 MINUTE",        # unquoted
            "INTERVAL '10' FORTNIGHT",   # bad unit
            "'10' MINUTE",               # missing keyword
            "INTERVAL '1.5' MINUTE",     # fractional
            "",
        ],
    )
    def test_invalid(self, text):
        with pytest.raises(ValueError):
            parse_interval(text)


class TestParseEmitClause:
    def test_stream(self):
        s = parse_emit_clause("EMIT STREAM")
        assert s.stream and not s.after_watermark and s.after_delay is None

    def test_after_watermark(self):
        s = parse_emit_clause("EMIT AFTER WATERMARK")
        assert not s.stream and s.after_watermark

    def test_stream_after_watermark(self):
        s = parse_emit_clause("EMIT STREAM AFTER WATERMARK")
        assert s.stream and s.after_watermark

    def test_stream_after_delay(self):
        s = parse_emit_clause("EMIT STREAM AFTER DELAY INTERVAL '6' MINUTES")
        assert s.stream and s.after_delay == timedelta(minutes=6)

    def test_combined_extension_7(self):
        s = parse_emit_clause(
            "EMIT STREAM AFTER DELAY INTERVAL '6' MINUTES AND AFTER WATERMARK"
        )
        assert s.stream and s.after_watermark and s.after_delay == timedelta(minutes=6)

    def test_combined_reversed_order(self):
        s = parse_emit_clause(
            "EMIT AFTER WATERMARK AND AFTER DELAY INTERVAL '1' MINUTE"
        )
        assert not s.stream and s.after_watermark
        assert s.after_delay == timedelta(minutes=1)

    def test_case_insensitive(self):
        s = parse_emit_clause("emit stream after watermark")
        assert s.stream and s.after_watermark

    def test_trailing_semicolon(self):
        assert parse_emit_clause("EMIT STREAM;").stream

    @pytest.mark.parametrize(
        "clause",
        [
            "EMIT NOTHING",
            "EMIT STREAM AFTER",
            "EMIT STREAM AFTER WATERMARK AND AFTER WATERMARK",
            "EMIT AFTER DELAY INTERVAL '1' MINUTE AND AFTER DELAY INTERVAL '2' MINUTE",
            "STREAM AFTER WATERMARK",
        ],
    )
    def test_invalid(self, clause):
        with pytest.raises(ValueError):
            parse_emit_clause(clause)


class TestSplitEmit:
    def test_no_emit_defaults_to_table(self):
        core, spec = split_emit("SELECT * FROM t;")
        assert core == "SELECT * FROM t"
        assert not spec.stream and spec.continuous

    def test_emit_stripped_from_core(self):
        core, spec = split_emit("SELECT * FROM t EMIT STREAM")
        assert core == "SELECT * FROM t"
        assert spec.stream

    def test_emit_with_delay(self):
        core, spec = split_emit(
            "SELECT * FROM t EMIT STREAM AFTER DELAY INTERVAL '6' MINUTES"
        )
        assert core == "SELECT * FROM t"
        assert spec.after_delay == timedelta(minutes=6)

    def test_multiple_emits_rejected(self):
        with pytest.raises(ValueError, match="top-level"):
            split_emit("SELECT * FROM (SELECT 1 EMIT STREAM) EMIT STREAM")

    def test_nested_emit_rejected(self):
        with pytest.raises(ValueError, match="final top-level clause"):
            split_emit("SELECT * FROM (SELECT 1 EMIT STREAM)")

    def test_multiline_query(self):
        core, spec = split_emit("SELECT *\nFROM t\nEMIT STREAM AFTER WATERMARK;\n")
        assert core.endswith("FROM t")
        assert spec.stream and spec.after_watermark
