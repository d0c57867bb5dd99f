"""Unit tests for EmitSpec (Extensions 4-7 configuration object)."""
from datetime import timedelta

import pytest

from repro.core.emit import (
    STREAM,
    STREAM_AFTER_WATERMARK,
    TABLE_AFTER_WATERMARK,
    TABLE_DEFAULT,
    EmitSpec,
)


class TestValidation:
    def test_default_is_continuous_table(self):
        assert TABLE_DEFAULT.continuous and not TABLE_DEFAULT.stream

    def test_negative_delay_rejected(self):
        with pytest.raises(ValueError, match="positive"):
            EmitSpec(after_delay=timedelta(minutes=-1))

    def test_zero_delay_rejected(self):
        with pytest.raises(ValueError, match="positive"):
            EmitSpec(after_delay=timedelta(0))

    def test_negative_lateness_rejected(self):
        with pytest.raises(ValueError, match="non-negative"):
            EmitSpec(allowed_lateness=timedelta(seconds=-1))

    def test_frozen(self):
        with pytest.raises(Exception):
            STREAM.stream = False


class TestContinuous:
    def test_stream_is_continuous(self):
        assert STREAM.continuous

    def test_watermark_gate_is_not_continuous(self):
        assert not TABLE_AFTER_WATERMARK.continuous
        assert not STREAM_AFTER_WATERMARK.continuous

    def test_delay_gate_is_not_continuous(self):
        assert not EmitSpec(after_delay=timedelta(minutes=6)).continuous


class TestDescribe:
    def test_plain_table(self):
        assert "continuous table" in TABLE_DEFAULT.describe()

    def test_stream(self):
        assert STREAM.describe() == "EMIT STREAM"

    def test_stream_after_watermark(self):
        assert STREAM_AFTER_WATERMARK.describe() == "EMIT STREAM AFTER WATERMARK"

    def test_combined(self):
        s = EmitSpec(
            stream=True, after_watermark=True, after_delay=timedelta(minutes=6)
        )
        assert (
            s.describe()
            == "EMIT STREAM AFTER DELAY INTERVAL '360' SECOND AND AFTER WATERMARK"
        )
