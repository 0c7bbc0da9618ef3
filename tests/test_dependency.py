"""Dependency→multievent compilation tests (paper §2.3)."""
import pytest

from repro.core.analyzer import AIQLSemanticError
from repro.core.ast import TemporalConstraint
from repro.core.dependency import to_multievent
from repro.core.parser import parse

FWD = ('forward\n'
       'proc p write file f as e1\n'
       'proc q read file f as e2\n'
       'proc q write file g as e3\n'
       'return p')


class TestForward:
    def test_mode_becomes_multievent(self):
        q = to_multievent(parse(FWD))
        assert q.mode == "multievent"

    def test_implied_temporal_order(self):
        q = to_multievent(parse(FWD))
        assert q.temporal == [TemporalConstraint("e1", "before", "e2"),
                              TemporalConstraint("e2", "before", "e3")]

    def test_original_query_untouched(self):
        raw = parse(FWD)
        to_multievent(raw)
        assert raw.mode == "forward" and raw.temporal == []


class TestBackward:
    def test_reversed_temporal(self):
        q = to_multievent(parse(FWD.replace("forward", "backward")))
        assert q.temporal == [TemporalConstraint("e2", "before", "e1"),
                              TemporalConstraint("e3", "before", "e2")]


class TestChaining:
    def test_gap_raises(self):
        bad = ('forward\n'
               'proc p write file f as e1\n'
               'proc q read file g as e2\n'  # shares nothing with e1
               'return p')
        with pytest.raises(AIQLSemanticError, match="path breaks"):
            to_multievent(parse(bad))

    def test_connect_bridges_hosts(self):
        ok = ('forward\n'
              'proc p connect ip i as e1\n'
              'proc q write file f as e2\n'  # no shared var, but e1 is connect
              'return p')
        q = to_multievent(parse(ok))
        assert q.temporal == [TemporalConstraint("e1", "before", "e2")]

    def test_single_event_raises(self):
        with pytest.raises(AIQLSemanticError, match="at least two"):
            to_multievent(parse('forward\nproc p write file f as e1\nreturn p'))


class TestPassthrough:
    def test_multievent_unchanged(self):
        q = parse('proc p read file f as e1\nreturn p')
        assert to_multievent(q) is q

    def test_existing_temporal_preserved(self):
        src = ('forward\n'
               'proc p write file f as e1\n'
               'proc q read file f as e2\n'
               'with e1 before[1 min] e2\n'
               'return p')
        q = to_multievent(parse(src))
        assert len(q.temporal) == 2
        assert q.temporal[0].within_ms == 60_000
