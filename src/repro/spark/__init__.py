"""PySpark engines: micro-batch CROWN, baselines, HyperCube-partitioned CROWN."""
