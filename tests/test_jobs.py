"""Every job entrypoint runs end-to-end at tiny scale and prints a table."""
import io
import sys
from contextlib import redirect_stdout

import pytest

sys.path.insert(0, "jobs")


def _run(module_name, argv):
    mod = __import__(module_name)
    buf = io.StringIO()
    with redirect_stdout(buf):
        mod.main(argv)
    out = buf.getvalue()
    assert "----" in out, f"{module_name} printed no table:\n{out}"
    return out


def test_job_fig07():
    out = _run("fig07_latency_bulk_evict", ["--n", "256", "--m", "32", "--rounds", "3"])
    assert "b_fiba4" in out and "median_us" in out


def test_job_fig08():
    out = _run("fig08_latency_bulk_insert", ["--n", "256", "--m", "32", "--rounds", "3"])
    assert "daba_lite" in out


def test_job_fig09():
    out = _run("fig09_latency_ooo_insert",
               ["--n", "256", "--m", "32", "--d", "32", "--rounds", "3"])
    assert "amta" not in out  # in-order-only algs are excluded


def test_job_fig10():
    out = _run("fig10_ablation_freelist", ["--n", "256", "--m", "64", "--rounds", "3"])
    assert "b_fiba4_fl" in out and "b_fiba4_nofl" in out


def test_job_fig11():
    out = _run("fig11_throughput_evict",
               ["--n", "256", "--total-items", "256", "--reps", "1"])
    assert "tput_items_s" in out


def test_job_fig12():
    out = _run("fig12_throughput_evict_insert",
               ["--n", "256", "--total-items", "256", "--reps", "1"])
    assert "m=" in out


def test_job_fig13():
    out = _run("fig13_throughput_ooo_bulk",
               ["--n", "256", "--m", "32", "--total-items", "128", "--reps", "1"])
    assert "d=" in out


def test_job_fig14():
    out = _run("fig14_throughput_ooo_single",
               ["--n", "256", "--total-items", "128", "--reps", "1"])
    assert "nb_fiba8" in out


def test_job_fig15():
    out = _run("fig15_large_window",
               ["--n-small", "256", "--n-large", "512", "--m", "32", "--rounds", "3"])
    assert "tput_ratio" in out


def test_job_fig16():
    out = _run("fig16_citibike",
               ["--n-events", "500", "--window-seconds", "900", "--reps", "1"])
    assert "profile" in out


def test_job_fig17_driver(spark):
    """fig17's experiment body, on the shared session (the job's own
    main() would stop the shared SparkSession; see jobs/fig17...py)."""
    from repro.experiments import fig17_spark_system

    header, rows = fig17_spark_system(spark, n=512, ms=(128,), n_keys=2, batches=2)
    assert {r[0] for r in rows} == {"fiba_operator", "spark_recompute"}
    assert all(r[3] > 0 for r in rows)
