"""spark-submit entrypoints, one per evaluation artifact (see DESIGN.md)."""
