"""Real-Spark integrations: the SparkSQL baseline and write-ahead
lineage applied to staged Spark pipelines."""
