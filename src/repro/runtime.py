"""SparkSession bootstrap for `spark-submit` / plain-python job entrypoints.

Tests use the session fixture in conftest.py; jobs call :func:`job_session`.
Same settings (local master, disabled broadcast autotuning so shuffle paths
are exercised, Arrow on) so job results match test expectations.
"""
import os


def _driver_mem() -> str:
    """~75% of the cgroup memory limit (mirrors conftest.py), fallback 48g."""
    if m := os.environ.get("SPARK_DRIVER_MEM"):
        return m
    for p in (
        "/sys/fs/cgroup/memory.max",
        "/sys/fs/cgroup/memory/memory.limit_in_bytes",
    ):
        try:
            raw = open(p).read().strip()
            if not raw or raw == "max":
                continue
            gib = int(raw) / (1 << 30)
            if 1 <= gib <= 1024:
                return f"{max(1, int(gib * 0.75))}g"
        except (OSError, ValueError):
            continue
    return "48g"


def job_session(app: str):
    # spark.driver.memory is read at JVM launch, not from SparkConf, so it
    # must be in PYSPARK_SUBMIT_ARGS before the first SparkContext exists.
    os.environ.setdefault("SPARK_DRIVER_MEM", _driver_mem())
    os.environ.setdefault(
        "PYSPARK_SUBMIT_ARGS",
        f"--master {os.environ.get('SPARK_MASTER', 'local[*]')} "
        f"--driver-memory {os.environ['SPARK_DRIVER_MEM']} "
        "--conf spark.driver.host=127.0.0.1 "
        "--conf spark.ui.enabled=false "
        "pyspark-shell",
    )
    from pyspark.sql import SparkSession

    return (
        SparkSession.builder.appName(app)
        .master(os.environ.get("SPARK_MASTER", "local[*]"))
        .config("spark.sql.shuffle.partitions", os.environ.get("SPARK_SHUFFLE_PARTITIONS", "64"))
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .config("spark.ui.enabled", "false")
        .config("spark.ui.showConsoleProgress", "false")
        .config("spark.driver.host", "127.0.0.1")
        .getOrCreate()
    )
