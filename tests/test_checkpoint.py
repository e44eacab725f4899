"""Unit tests for shadow loaders and differential checkpointing (§6.1)."""
import pytest

from repro.core.checkpoint import (
    CheckpointStore,
    DifferentialCheckpointer,
    ShadowLoader,
)
from repro.core.source_loader import SourceLoader
from repro.data.sources import coyo_lite


@pytest.fixture
def spec():
    return coyo_lite()[0]


class TestStore:
    def test_versions_increment(self):
        st = CheckpointStore()
        assert st.put("k", {"a": 1}) == 1
        assert st.put("k", {"a": 2}) == 2
        assert st.latest("k") == (2, {"a": 2})

    def test_missing_key(self):
        with pytest.raises(KeyError):
            CheckpointStore().latest("nope")

    def test_has(self):
        st = CheckpointStore()
        assert not st.has("k")
        st.put("k", 1)
        assert st.has("k")


class TestDifferential:
    def test_loader_interval_must_dominate(self):
        with pytest.raises(ValueError):
            DifferentialCheckpointer(CheckpointStore(), planner_interval=4, loader_interval=2)

    def test_planner_checkpointed_more_often(self, spec):
        st = CheckpointStore()
        dc = DifferentialCheckpointer(st, planner_interval=1, loader_interval=4)
        ld = SourceLoader(spec)
        for step in range(8):
            ld.fill(2)
            dc.on_step(step, {"step": step}, [ld])
        assert st.n_versions("planner") == 8
        assert st.n_versions(f"loader/{spec.name}/0") == 2  # steps 0 and 4

    def test_recover_replays_gap(self, spec):
        st = CheckpointStore()
        dc = DifferentialCheckpointer(st, loader_interval=4)
        ld = SourceLoader(spec)
        ld.fill(4)
        dc.on_step(0, {}, [ld])  # checkpoint at cursor 4
        ld.fill(6)  # cursor now 10
        ld.fail()
        replay = dc.recover_loader(ld)
        assert replay == 6
        assert ld.state.cursor == 10  # caught back up
        assert len(ld.summary_buffer()) == 6

    def test_recover_planner(self):
        st = CheckpointStore()
        dc = DifferentialCheckpointer(st)
        dc.on_step(0, {"mix": [0.5, 0.5]}, [])
        state = dc.recover_planner()
        assert state["mix"] == [0.5, 0.5] and state["step"] == 0


class TestShadow:
    def test_sync_matches_cursor(self, spec):
        active = SourceLoader(spec)
        sh = ShadowLoader(active)
        active.fill(7)
        sh.sync()
        assert sh.lag_rows == 0
        assert sh.standby.state.cursor == 7

    def test_lag_before_sync(self, spec):
        active = SourceLoader(spec)
        sh = ShadowLoader(active)
        active.fill(5)
        assert sh.lag_rows == 5

    def test_promote_continues_stream(self, spec):
        active = SourceLoader(spec, seed=1)
        sh = ShadowLoader(active)
        active.fill(10)
        sh.sync()
        active.fail()
        promoted = sh.promote()
        # the failed loader's 10 buffered-but-undelivered rows were
        # re-read by the standby; new fills continue after them
        assert list(promoted.summary_buffer()["row_idx"]) == list(range(10))
        promoted.fill(5)
        assert list(promoted.summary_buffer()["row_idx"]) == list(range(15))

    def test_promote_skips_delivered_rows(self, spec):
        active = SourceLoader(spec, seed=1)
        sh = ShadowLoader(active)
        active.fill(10)
        active.prepare(list(range(6)))  # rows 0-5 delivered to a plan
        sh.sync()
        active.fail()
        promoted = sh.promote()
        # only the undelivered tail is re-read — no duplicate delivery
        assert list(promoted.summary_buffer()["row_idx"]) == list(range(6, 10))

    def test_promote_installs_fresh_standby(self, spec):
        active = SourceLoader(spec)
        sh = ShadowLoader(active)
        active.fill(3)
        sh.sync()
        promoted = sh.promote()
        assert sh.active is promoted
        assert sh.standby is not promoted
        assert sh.standby.state.cursor == promoted.state.cursor

    def test_sync_skips_failed_active(self, spec):
        active = SourceLoader(spec)
        sh = ShadowLoader(active)
        active.fill(4)
        sh.sync()
        active.fill(4)
        active.fail()
        sh.sync()  # must not copy failed state
        assert sh.standby.state.cursor == 4
