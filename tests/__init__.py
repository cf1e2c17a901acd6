import os

# Collected before the session fixture instantiates Spark: fewer shuffle
# partitions keep the many tiny test queries fast (AQE coalesces anyway).
os.environ.setdefault("SPARK_SHUFFLE_PARTITIONS", "8")
