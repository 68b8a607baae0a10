"""Sliding-window driver tests (Definitions 1-2 semantics)."""
import pandas as pd
import pytest

from repro.streams.window import sliding_batches


def _stream(n_per_stream=30):
    rows = []
    rid = 0
    for i in range(n_per_stream):
        for sid in (0, 1):
            rows.append({"rid": rid, "stream_id": sid, "ts": rid, "v": rid})
            rid += 1
    return pd.DataFrame(rows)


class TestSlidingBatches:
    def test_warmup_fills_each_stream(self):
        s = _stream(30)
        batches = list(sliding_batches(s, w=10, batch_size=5))
        wb0 = batches[0]
        assert wb0.step == 0
        assert (wb0.arrived["stream_id"] == 0).sum() == 10
        assert (wb0.arrived["stream_id"] == 1).sum() == 10
        assert wb0.expired_rids == []
        assert wb0.window_before.empty

    def test_steady_state_batch_size(self):
        s = _stream(30)
        batches = list(sliding_batches(s, w=10, batch_size=5))
        for wb in batches[1:-1]:
            assert len(wb.arrived) == 10  # 5 per stream x 2 streams

    def test_expiry_count_matches_arrivals(self):
        s = _stream(30)
        batches = list(sliding_batches(s, w=10, batch_size=5))
        wb1 = batches[1]
        # window full after warmup: every arrival expires one tuple
        assert len(wb1.expired_rids) == len(wb1.arrived)

    def test_expired_are_oldest(self):
        s = _stream(30)
        batches = list(sliding_batches(s, w=10, batch_size=5))
        wb1 = batches[1]
        oldest = s.iloc[: len(wb1.expired_rids)]["rid"].tolist()
        assert sorted(wb1.expired_rids) == sorted(oldest)

    def test_window_before_is_w_per_stream(self):
        s = _stream(30)
        batches = list(sliding_batches(s, w=10, batch_size=5))
        wb1 = batches[1]
        counts = wb1.window_before["stream_id"].value_counts()
        assert counts[0] == 10 and counts[1] == 10

    def test_window_slides(self):
        s = _stream(30)
        batches = list(sliding_batches(s, w=10, batch_size=5))
        w1 = set(batches[1].window_before["rid"])
        w2 = set(batches[2].window_before["rid"])
        assert w1 != w2
        assert len(w1) == len(w2) == 20
        # window_before(step 2) = window_before(step 1) minus step-1
        # expirations plus step-1 arrivals
        expect = (w1 - set(batches[1].expired_rids)) | set(batches[1].arrived["rid"])
        assert w2 == expect

    def test_max_batches(self):
        s = _stream(50)
        batches = list(sliding_batches(s, w=10, batch_size=5, max_batches=2))
        assert [b.step for b in batches] == [0, 1, 2]

    def test_stream_exhaustion(self):
        s = _stream(12)
        batches = list(sliding_batches(s, w=10, batch_size=5))
        total = sum(len(b.arrived) for b in batches)
        assert total == len(s)

    def test_no_warmup(self):
        s = _stream(12)
        batches = list(sliding_batches(s, w=10, batch_size=3, warmup=False))
        assert batches[0].step == 0
        assert len(batches[0].arrived) == 6
