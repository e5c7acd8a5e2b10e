"""Job entrypoints: importable as scripts and argparse wiring sane."""
import runpy
import subprocess
import sys
from pathlib import Path

import pytest

JOBS = sorted(
    p.name for p in (Path(__file__).parent.parent / "jobs").glob("*.py")
    if not p.name.startswith("_")
)


def test_all_tables_have_jobs():
    assert JOBS == [
        "fig10_scalability.py", "fig11_runtime_params.py",
        "fig4_link_prediction.py", "fig5_graph_reconstruction.py",
        "fig6_node_classification.py", "fig7_efficiency.py",
        "fig8_param_analysis.py", "fig9_evolving.py",
        "table1_ppr_example.py", "table3_datasets.py",
    ]


@pytest.mark.parametrize("job", JOBS)
def test_job_help_runs(job):
    """--help exercises imports + argparse of every entrypoint the way
    spark-submit would invoke it (script dir on sys.path)."""
    out = subprocess.run(
        [sys.executable, str(Path(__file__).parent.parent / "jobs" / job),
         "--help"],
        capture_output=True, text=True, timeout=120,
    )
    assert out.returncode == 0, out.stderr
    assert "--seed" in out.stdout
