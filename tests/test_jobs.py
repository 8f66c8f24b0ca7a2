"""Smoke tests: every jobs/ entrypoint runs and prints its table.

Jobs read scale knobs from env, so we shrink them here; ``get_spark``
resolves to the session-scoped test Spark via ``getOrCreate``.
"""
import importlib.util
import os
import sys

import pytest

JOBS = os.path.join(os.path.dirname(__file__), os.pardir, "jobs")


def load_job(name):
    spec = importlib.util.spec_from_file_location(
        f"jobs_{name}", os.path.join(JOBS, f"{name}.py")
    )
    mod = importlib.util.module_from_spec(spec)
    spec.loader.exec_module(mod)
    return mod


@pytest.fixture()
def tiny_env(monkeypatch):
    monkeypatch.setenv("REPRO_M", "3000")
    monkeypatch.setenv("REPRO_K", "5")
    monkeypatch.setenv("REPRO_TESTS", "100")


class TestJobEntrypoints:
    def test_table1(self, capsys):
        load_job("table1_networks").main()
        out = capsys.readouterr().out
        assert "alarm" in out and "munin" in out
        assert "509" in out  # paper param target shown

    def test_table2(self, spark, tiny_env, capsys, monkeypatch):
        monkeypatch.setattr(sys, "argv", ["table2", "alarm"])
        load_job("table2_classification").main()
        out = capsys.readouterr().out
        assert "Table 2" in out and "alarm" in out and "paper" in out

    def test_table3(self, spark, tiny_env, capsys, monkeypatch):
        monkeypatch.setattr(sys, "argv", ["table3", "alarm"])
        load_job("table3_communication").main()
        out = capsys.readouterr().out
        assert "Table 3" in out
        assert "222,000" in out  # exact = 2 * 3000 * 37

    def test_fig9(self, spark, tiny_env, capsys, monkeypatch):
        monkeypatch.setattr(sys, "argv", ["fig9", "alarm", "5000"])
        load_job("fig9_comm_vs_m").main()
        out = capsys.readouterr().out
        assert "Figure 9" in out and "x" in out

    def test_fig10(self, tiny_env, capsys, monkeypatch):
        monkeypatch.setattr(sys, "argv", ["fig10", "alarm"])
        load_job("fig10_error_vs_eps").main()
        out = capsys.readouterr().out
        assert "Figure 10" in out

    def test_fig11(self, spark, tiny_env, capsys, monkeypatch):
        monkeypatch.setattr(sys, "argv", ["fig11", "4000"])
        load_job("fig11_comm").main()
        out = capsys.readouterr().out
        assert "Figure 11(a)" in out and "Figure 11(b)" in out

    def test_streaming_demo(self, spark, tiny_env, capsys, monkeypatch):
        monkeypatch.setattr(sys, "argv", ["streaming_demo", "alarm", "2000"])
        load_job("streaming_demo").main()
        out = capsys.readouterr().out
        assert "micro-batches" in out and "messages" in out
