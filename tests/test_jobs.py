"""Job entrypoints parse args and emit their tables (smoke scale)."""
import pytest


def _load(name):
    import importlib.util
    import pathlib

    path = pathlib.Path(__file__).resolve().parents[1] / "jobs" / f"{name}.py"
    spec = importlib.util.spec_from_file_location(name, path)
    mod = importlib.util.module_from_spec(spec)
    spec.loader.exec_module(mod)
    return mod


def test_run_table11_main(capsys):
    mod = _load("run_table11")
    rc = mod.main(["--users", "8", "--groups", "2", "--stream", "80", "--datasets", "movie"])
    assert rc == 0
    out = capsys.readouterr().out
    assert "| dataset | h |" in out
    assert "movie" in out


def test_run_table12_main(capsys):
    mod = _load("run_table12")
    rc = mod.main(["--users", "6", "--groups", "2", "--stream", "80", "--datasets", "publication"])
    assert rc == 0
    out = capsys.readouterr().out
    assert "| dataset | W | h |" in out


def test_run_timing_main(capsys):
    mod = _load("run_timing")
    rc = mod.main(
        ["--users", "6", "--groups", "2", "--datasets", "movie", "--n", "100", "200"]
    )
    assert rc == 0
    out = capsys.readouterr().out
    assert "Baseline" in out


@pytest.mark.usefixtures("spark")
def test_run_streaming_demo_run(spark, capsys):
    mod = _load("run_streaming_demo")
    import argparse

    args = argparse.Namespace(
        users=8, groups=2, stream=60, h=0.6, window=None, batches=2
    )
    rc = mod.run(spark, args)
    assert rc == 0
    out = capsys.readouterr().out
    assert "precision" in out
