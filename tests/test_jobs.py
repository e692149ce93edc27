"""Job-entrypoint tests: every spark-submit script runs end to end at
tiny scale and emits its table."""
import pathlib
import subprocess
import sys

import pytest

JOBS = pathlib.Path(__file__).resolve().parent.parent / "jobs"

LIGHT = ["table1_datasets.py", "table2_defaults.py"]
SPARK = ["table4_decomposed_build.py", "table8_decomposed_detection.py"]


def _run(script, *args):
    return subprocess.run(
        [sys.executable, str(JOBS / script), *args],
        capture_output=True, text=True, timeout=900,
    )


@pytest.mark.parametrize("script", LIGHT)
def test_light_jobs_run(script, tmp_path):
    out = tmp_path / "t.md"
    p = _run(script, "--n", "150", "--out", str(out))
    assert p.returncode == 0, p.stderr[-2000:]
    text = out.read_text()
    assert "Deep" in text and "Words" in text


@pytest.mark.parametrize("script", SPARK)
def test_spark_jobs_run(script, tmp_path):
    out = tmp_path / "t.md"
    p = _run(script, "--n", "150", "--out", str(out))
    assert p.returncode == 0, p.stderr[-2000:]
    assert "paper_MRPG" in out.read_text()


def test_job_dataset_subset(tmp_path):
    out = tmp_path / "t.md"
    p = _run("table1_datasets.py", "--datasets", "SIFT", "--out", str(out))
    assert p.returncode == 0, p.stderr[-2000:]
    text = out.read_text()
    assert "SIFT" in text and "Glove" not in text


def test_all_eight_job_scripts_exist():
    names = sorted(p.name for p in JOBS.glob("table*.py"))
    assert len(names) == 8
    assert names[0].startswith("table1") and names[-1].startswith("table8")
