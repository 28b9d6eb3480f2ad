"""Job entry points, one per evaluation table (see DESIGN.md §6)."""
