"""Unit tests for the supervisor orchestration loop (paper §3.4)."""
import numpy as np
import pytest

from repro.selector.metadata_backend import LocalMetadataBackend
from repro.selector.presampling import NewDataStrategy
from repro.selector.selector import Selector
from repro.selector.trigger_sample_storage import TriggerSampleStorage
from repro.supervisor import DataAmountTrigger, Supervisor, TimeTrigger


def _selector(tmp_path, reset=True):
    backend = LocalMetadataBackend(str(tmp_path / "meta"))
    strat = NewDataStrategy(backend, reset_after_trigger=reset, partition_size=100)
    return Selector("pipe", strat, TriggerSampleStorage(str(tmp_path / "tss")))


def _batch(keys, ts=None):
    keys = np.asarray(keys, np.int64)
    ts = np.asarray(ts if ts is not None else np.zeros(len(keys)), np.int64)
    return keys, ts, np.zeros(len(keys), np.int64)


class TestSupervisorAmount:
    def test_trigger_set_contains_exactly_the_window(self, tmp_path):
        sel = _selector(tmp_path)
        fired = []
        sup = Supervisor(DataAmountTrigger(data_points_for_trigger=4), sel, fired.append)
        sup.process_batch(*_batch(range(10)))
        assert len(fired) == 2
        k0, _ = sel.get_all_samples(0)
        k1, _ = sel.get_all_samples(1)
        assert sorted(k0.tolist()) == [0, 1, 2, 3]
        assert sorted(k1.tolist()) == [4, 5, 6, 7]

    def test_leftover_samples_wait_for_next_trigger(self, tmp_path):
        sel = _selector(tmp_path)
        fired = []
        sup = Supervisor(DataAmountTrigger(data_points_for_trigger=4), sel, fired.append)
        sup.process_batch(*_batch(range(10)))  # 8, 9 pending
        sup.process_batch(*_batch(range(10, 12)))  # completes the third window
        assert len(fired) == 3
        k2, _ = sel.get_all_samples(2)
        assert sorted(k2.tolist()) == [8, 9, 10, 11]

    def test_flush_fires_final_partial_trigger(self, tmp_path):
        sel = _selector(tmp_path)
        fired = []
        sup = Supervisor(DataAmountTrigger(data_points_for_trigger=4), sel, fired.append)
        sup.process_batch(*_batch(range(6)))
        assert sup.flush() == 1
        k1, _ = sel.get_all_samples(1)
        assert sorted(k1.tolist()) == [4, 5]

    def test_flush_with_nothing_pending_is_noop(self, tmp_path):
        sel = _selector(tmp_path)
        sup = Supervisor(DataAmountTrigger(data_points_for_trigger=2), sel, lambda i: None)
        sup.process_batch(*_batch(range(4)))
        assert sup.flush() == 0

    def test_trigger_ids_strictly_increase(self, tmp_path):
        sel = _selector(tmp_path)
        fired = []
        sup = Supervisor(DataAmountTrigger(data_points_for_trigger=1), sel, fired.append)
        sup.process_batch(*_batch(range(5)))
        assert [f.trigger_id for f in fired] == [0, 1, 2, 3, 4]

    def test_on_inform_hook_sees_trigger_attribution(self, tmp_path):
        sel = _selector(tmp_path)
        informed = []
        sup = Supervisor(
            DataAmountTrigger(data_points_for_trigger=3),
            sel,
            lambda i: None,
            on_inform=lambda t, k, ts, lb: informed.append((t, k.tolist())),
        )
        sup.process_batch(*_batch(range(7)))
        assert informed == [(0, [0, 1, 2]), (1, [3, 4, 5]), (2, [6])]


class TestSupervisorTime:
    def test_yearly_windows(self, tmp_path):
        sel = _selector(tmp_path)
        fired = []
        sup = Supervisor(TimeTrigger(every=1, start_timestamp=2004), sel, fired.append)
        keys = np.arange(9)
        years = np.array([2004] * 3 + [2005] * 3 + [2006] * 3)
        sup.process_batch(*_batch(keys, years))
        sup.flush()
        assert len(fired) == 3
        for t, expect in enumerate([[0, 1, 2], [3, 4, 5], [6, 7, 8]]):
            k, _ = sel.get_all_samples(t)
            assert sorted(k.tolist()) == expect

    def test_boundary_between_batches_fires_at_minus_one(self, tmp_path):
        sel = _selector(tmp_path)
        fired = []
        sup = Supervisor(TimeTrigger(every=1, start_timestamp=2004), sel, fired.append)
        sup.process_batch(*_batch([0, 1], [2004, 2004]))
        sup.process_batch(*_batch([2, 3], [2005, 2005]))
        assert len(fired) == 1
        k0, _ = sel.get_all_samples(0)
        assert sorted(k0.tolist()) == [0, 1]

    def test_empty_interval_does_not_train_on_nothing(self, tmp_path):
        sel = _selector(tmp_path)
        fired = []
        sup = Supervisor(TimeTrigger(every=1, start_timestamp=2004), sel, fired.append)
        sup.process_batch(*_batch([0], [2004]))
        sup.process_batch(*_batch([1], [2009]))  # 4 empty years skipped
        sup.flush()
        assert len(fired) == 2
        assert fired[0].num_samples == 1 and fired[1].num_samples == 1

    def test_weights_default_to_one(self, tmp_path):
        sel = _selector(tmp_path)
        sup = Supervisor(DataAmountTrigger(data_points_for_trigger=2), sel, lambda i: None)
        sup.process_batch(*_batch(range(2)))
        _, w = sel.get_all_samples(0)
        assert np.allclose(w, 1.0)

    def test_info_counts_match(self, tmp_path):
        sel = _selector(tmp_path)
        fired = []
        sup = Supervisor(DataAmountTrigger(data_points_for_trigger=5), sel, fired.append)
        sup.process_batch(*_batch(range(5)))
        assert fired[0].num_samples == 5
        assert fired[0].num_partitions == 1
