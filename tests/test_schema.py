"""Data-model tests: event schema and operation/object-type validation."""
import pytest
from pyspark.sql import types as T

from repro.monitor.schema import EVENT_COLUMNS, etype_for, event_spark_schema


class TestSchema:
    def test_column_count(self):
        assert len(EVENT_COLUMNS) == 16

    def test_spark_schema_matches_columns(self):
        s = event_spark_schema()
        assert [f.name for f in s.fields] == [n for n, _ in EVENT_COLUMNS]

    def test_ts_is_long(self):
        s = event_spark_schema()
        assert s["ts"].dataType == T.LongType()

    def test_agentid_is_int(self):
        s = event_spark_schema()
        assert s["agentid"].dataType == T.IntegerType()

    def test_all_nullable(self):
        assert all(f.nullable for f in event_spark_schema().fields)


class TestEtypeFor:
    @pytest.mark.parametrize("op,obj,etype", [
        ("start", "proc", "process"),
        ("execute", "proc", "process"),
        ("read", "file", "file"),
        ("write", "file", "file"),
        ("delete", "file", "file"),
        ("read", "ip", "network"),
        ("write", "ip", "network"),
        ("connect", "ip", "network"),
    ])
    def test_valid(self, op, obj, etype):
        assert etype_for(op, obj) == etype

    @pytest.mark.parametrize("op,obj", [
        ("start", "file"), ("start", "ip"), ("execute", "file"),
        ("connect", "file"), ("connect", "proc"), ("delete", "ip"),
        ("delete", "proc"), ("read", "proc"), ("write", "proc"),
    ])
    def test_invalid(self, op, obj):
        with pytest.raises(ValueError):
            etype_for(op, obj)

    def test_unknown_op(self):
        with pytest.raises(ValueError, match="unknown operation"):
            etype_for("frob", "file")
