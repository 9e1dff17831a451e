"""Table-reproduction harnesses (one per evaluation table, see DESIGN.md §2)."""
