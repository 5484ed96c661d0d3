"""Experiment-harness plumbing: table formatting, persistence, presets."""
import os
import py_compile

import pandas as pd
import pytest

from repro.experiments import RESULTS_DIR, print_table, save_table, to_markdown
from repro.experiments.fig5_fig6_graph import _args_for
from repro.experiments.fig11_graph_batch import GRAPH_PRESETS
from repro.graspan.gen import DATAFLOW_PRESETS, POINTSTO_PRESETS

import numpy as np


class TestTableFormatting:
    def test_to_markdown_shape(self):
        md = to_markdown(pd.DataFrame({"a": [1, 22], "bb": ["x", "y"]}))
        lines = md.splitlines()
        assert len(lines) == 4
        assert lines[0].startswith("| a")
        assert set(lines[1]) <= {"|", "-"}

    def test_to_markdown_empty(self):
        md = to_markdown(pd.DataFrame({"a": []}))
        assert md.splitlines()[0].startswith("| a")

    def test_save_table_roundtrip(self, tmp_path, monkeypatch, capsys):
        import repro.experiments as ex

        monkeypatch.setattr(ex, "RESULTS_DIR", str(tmp_path))
        path = ex.save_table("t1", pd.DataFrame({"x": [1]}))
        assert os.path.exists(path)
        assert "| x |" in open(path).read()
        assert "## t1" in capsys.readouterr().out

    def test_print_table(self, capsys):
        print_table("T", pd.DataFrame({"x": [3]}))
        out = capsys.readouterr().out
        assert "## T" in out and "| 3 |" in out


class TestPresets:
    def test_graph_presets_ordering(self):
        # twitter-lite is the big one, like the paper's twitter
        assert GRAPH_PRESETS["twitter-lite"]["n_edges"] > GRAPH_PRESETS["orkut-lite"]["n_edges"]

    def test_graspan_presets_ordering(self):
        assert DATAFLOW_PRESETS["linux-lite"]["n_nodes"] > DATAFLOW_PRESETS["httpd-lite"]["n_nodes"]
        assert POINTSTO_PRESETS["linux-lite"]["n_vars"] > POINTSTO_PRESETS["httpd-lite"]["n_vars"]

    def test_args_for_shapes(self):
        rng = np.random.default_rng(0)
        a = _args_for("lookup", rng, 100, 5, qid0=10)
        assert list(a.columns) == ["qid", "node"] and list(a["qid"]) == [10, 11, 12, 13, 14]
        p = _args_for("path", rng, 100, 3, qid0=0)
        assert list(p.columns) == ["qid", "ps", "pt"]


class TestJobsCompile:
    @pytest.mark.parametrize(
        "job",
        [
            "fig1_tpch_streaming", "fig6_graph_queries", "fig7_micro",
            "fig8_datalog", "fig9_10_graspan", "fig11_graph_batch",
            "fig12_tpch_rates",
        ],
    )
    def test_job_compiles(self, job):
        root = os.path.dirname(os.path.dirname(os.path.abspath(__file__)))
        py_compile.compile(os.path.join(root, "jobs", f"{job}.py"), doraise=True)
