"""spark-submit job entrypoints, one per evaluation artifact."""
