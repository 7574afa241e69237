"""Shared spark-submit session builder for the jobs/ entrypoints.

Mirrors conftest.py's session settings (driver memory from the cgroup
limit, shuffle partitions, Arrow, broadcast joins disabled so OOF's
explicit broadcasts are the only ones). ``spark.driver.memory`` is read
at JVM launch, so it must be in ``PYSPARK_SUBMIT_ARGS`` before pyspark
is imported — which is why the pyspark import lives inside
:func:`build_session`.

Jobs are written as ``main(spark)`` functions so tests can call them
with the pytest session fixture; the ``__main__`` blocks build an
equivalent session for ``spark-submit jobs/<name>.py``.
"""
import os


def _driver_mem() -> str:
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
    return "24g"


def build_session(app_name: str):
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
        SparkSession.builder.appName(app_name)
        .config("spark.sql.shuffle.partitions", os.environ.get("SPARK_SHUFFLE_PARTITIONS", "64"))
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .getOrCreate()
    )
