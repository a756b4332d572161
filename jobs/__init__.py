"""spark-submit entrypoints, one per reproduced table (see DESIGN.md §3)."""
