"""Smoke tests for the spark-submit entrypoints in jobs/.

The jobs call ``SparkSession.builder.getOrCreate()`` (which reuses the
test session) and ``spark.stop()`` in their finally blocks — stop is
monkeypatched to a no-op so the session-scoped fixture survives.
"""
import importlib.util
import pathlib

import pytest
from pyspark.sql import SparkSession

JOBS = pathlib.Path(__file__).resolve().parent.parent / "jobs"


def load_job(name: str):
    spec = importlib.util.spec_from_file_location(name, JOBS / f"{name}.py")
    mod = importlib.util.module_from_spec(spec)
    spec.loader.exec_module(mod)
    return mod


@pytest.fixture(autouse=True)
def keep_session_alive(monkeypatch):
    monkeypatch.setattr(SparkSession, "stop", lambda self: None)


class TestRunQuery:
    def test_query2_skos_csr(self, spark, capsys):
        job = load_job("run_query")
        assert job.main(["--query", "2", "--graph", "skos", "--engine", "csr"]) == 0
        out = capsys.readouterr().out
        assert "#results=1" in out

    def test_query1_spark_engine(self, spark, capsys):
        job = load_job("run_query")
        assert (
            job.main(["--query", "1", "--graph", "skos", "--engine", "spark"]) == 0
        )
        assert "#results=717" in capsys.readouterr().out

    def test_rejects_unknown_graph(self, spark):
        job = load_job("run_query")
        with pytest.raises(SystemExit):
            job.main(["--graph", "nope"])


class TestTableJobs:
    def test_table1_subset(self, spark, capsys):
        job = load_job("table1")
        assert job.main(["--graphs", "skos"]) == 0
        out = capsys.readouterr().out
        assert "Table 1" in out and "skos" in out
        assert "810 / 717" in out  # paper vs here #results

    def test_table2_subset(self, spark, capsys):
        job = load_job("table2")
        assert job.main(["--graphs", "generations"]) == 0
        out = capsys.readouterr().out
        assert "Table 2" in out and "0 / 0" in out
