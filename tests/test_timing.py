"""TimingLog phase accounting."""
import time

from repro.mice import TimingLog


class TestTimingLog:
    def test_time_context_accumulates(self):
        t = TimingLog()
        with t.time("a"):
            time.sleep(0.01)
        with t.time("a"):
            time.sleep(0.01)
        assert t.phases["a"] >= 0.02

    def test_add(self):
        t = TimingLog()
        t.add("x", 1.5)
        t.add("x", 0.5)
        assert t.phases["x"] == 2.0

    def test_bucket_prefix_sum(self):
        t = TimingLog()
        t.add("iter.cofactor", 1.0)
        t.add("iter.train", 2.0)
        t.add("preprocess.partition", 4.0)
        assert t.bucket("iter") == 3.0
        assert t.bucket("preprocess") == 4.0
        assert t.total() == 7.0

    def test_exception_still_records(self):
        t = TimingLog()
        try:
            with t.time("boom"):
                time.sleep(0.005)
                raise RuntimeError
        except RuntimeError:
            pass
        assert t.phases["boom"] > 0

    def test_as_dict_copy(self):
        t = TimingLog()
        t.add("a", 1.0)
        d = t.as_dict()
        d["a"] = 99.0
        assert t.phases["a"] == 1.0

    def test_empty(self):
        t = TimingLog()
        assert t.total() == 0.0 and t.bucket("x") == 0.0
