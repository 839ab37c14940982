"""Tests for task output buffers and the runtime elastic buffer (§4.2)."""
import pytest

from repro.engine.buffers import RuntimeElasticBuffer, SharedBuffer, ShuffleBuffer
from repro.engine.pages import Page, end_page


class TestRuntimeElasticBuffer:
    def test_initial_capacity_one_page(self):
        # §4.2.2: "we can initially set all buffer capacities to the size
        # of a page"
        assert RuntimeElasticBuffer().capacity_pages == 1

    def test_offer_respects_capacity(self):
        b = RuntimeElasticBuffer()
        assert b.offer(Page(rows=1, bytes=10))
        assert not b.offer(Page(rows=1, bytes=10))  # full

    def test_end_page_always_fits(self):
        b = RuntimeElasticBuffer()
        b.offer(Page(rows=1, bytes=10))
        assert b.offer(end_page())
        assert b.ended

    def test_empty_pull_grows_capacity_and_counts_turn_up(self):
        # Fig. 11: consumer finds buffer empty -> grow + count (§5.1 signal)
        b = RuntimeElasticBuffer()
        assert b.pull() is None
        assert b.turn_up_counter == 1
        assert b.capacity_pages == 2

    def test_pull_after_end_does_not_count(self):
        b = RuntimeElasticBuffer()
        b.offer(end_page())
        b.pull()  # the end page
        b.pull()  # empty, but ended
        assert b.turn_up_counter == 0

    def test_pull_returns_fifo(self):
        b = RuntimeElasticBuffer(capacity_pages=3)
        b.offer(Page(rows=1, bytes=1))
        b.offer(Page(rows=2, bytes=2))
        assert b.pull().rows == 1
        assert b.pull().rows == 2

    def test_resize_tracks_consumption(self):
        # §4.2.2: every 500 ms capacity tracks recent consumption
        b = RuntimeElasticBuffer(capacity_pages=100)
        for i in range(10):
            b.offer(Page(rows=1, bytes=1))
        for _ in range(10):
            b.pull()
        b.tick(now_s=0.6)
        assert b.capacity_pages == 10

    def test_resize_has_floor_of_one(self):
        b = RuntimeElasticBuffer(capacity_pages=5)
        b.tick(now_s=0.6)
        assert b.capacity_pages == 1

    def test_resize_waits_for_interval(self):
        b = RuntimeElasticBuffer(capacity_pages=5)
        b.tick(now_s=0.3)
        assert b.capacity_pages == 5


class TestSharedBuffer:
    def test_round_robin_get(self):
        b = SharedBuffer(buffer_ids=[0, 1])
        b.put(Page(rows=1, bytes=1))
        b.put(Page(rows=2, bytes=2))
        assert b.get(0).rows == 1
        assert b.get(1).rows == 2
        assert b.get(0) is None

    def test_unknown_buffer_id(self):
        with pytest.raises(KeyError):
            SharedBuffer(buffer_ids=[0]).get(7)

    def test_buffer_id_array_is_dynamic(self):
        # §4.2.1: the buffer ID array adapts to downstream DOP changes
        b = SharedBuffer(buffer_ids=[0])
        b.add_buffer_id(1)
        assert b.buffer_ids == [0, 1]
        b.remove_buffer_id(0)
        assert b.buffer_ids == [1]

    def test_duplicate_buffer_id_rejected(self):
        b = SharedBuffer(buffer_ids=[0])
        with pytest.raises(ValueError):
            b.add_buffer_id(0)

    def test_end_signal_delivers_end_page_to_each_consumer_once(self):
        # §4.3/§4.4: end signal -> end pages broadcast downstream
        b = SharedBuffer(buffer_ids=[0, 1])
        b.send_end_signal()
        assert b.get(0).is_end
        assert b.get(0) is None  # only once per consumer
        assert b.get(1).is_end

    def test_page_cache_retains_when_enabled(self):
        b = SharedBuffer(buffer_ids=[0], caching=True)
        b.put(Page(rows=1, bytes=1))
        b.get(0)
        assert len(b.page_cache) == 1

    def test_end_page_put_marks_ended(self):
        b = SharedBuffer(buffer_ids=[0])
        b.put(end_page())
        assert b.get(0).is_end


class TestShuffleBuffer:
    def test_executor_count_tracks_downstream_tasks(self):
        # §4.2.1: number of shuffle executors == number of downstream tasks
        b = ShuffleBuffer()
        sh = b.new_group([0, 1, 2])
        assert sh.n_executors == 3
        sh.add_id(3)
        assert sh.n_executors == 4

    def test_hash_partitioning_by_key(self):
        b = ShuffleBuffer()
        b.new_group([0, 1])
        b.put(Page(rows=1, bytes=1), key=4)   # 4 % 2 -> buffer id 0
        b.put(Page(rows=2, bytes=2), key=5)   # 5 % 2 -> buffer id 1
        assert b.get(0).rows == 1
        assert b.get(1).rows == 2

    def test_task_groups_for_dop_switching(self):
        # §4.5: buffer-ID groups form task groups; a new group serves the
        # new distributed hash table while the old one still serves probes
        b = ShuffleBuffer()
        b.new_group([0, 1])
        b.new_group([2, 3, 4])
        assert b.task_groups() == [[0, 1], [2, 3, 4]]
        b.put(Page(rows=7, bytes=7), key=0)
        # both active groups receive the stream
        assert b.get(0).rows == 7
        assert b.get(2).rows == 7

    def test_retire_group(self):
        b = ShuffleBuffer()
        g0 = b.new_group([0, 1])
        b.new_group([2, 3])
        b.retire_group(g0.shuffler_id)
        assert b.task_groups() == [[2, 3]]
        with pytest.raises(KeyError):
            b.get(0)

    def test_end_signal(self):
        b = ShuffleBuffer()
        b.new_group([0])
        b.send_end_signal()
        assert b.get(0).is_end
        assert b.get(0) is None

    def test_page_cache(self):
        # §4.2.1: page cache used for reshuffling / build-side redistribution
        b = ShuffleBuffer(caching=True)
        b.new_group([0])
        b.put(Page(rows=1, bytes=1), key=0)
        assert len(b.page_cache) == 1
