"""End-to-end experiment harness and per-table drivers reproducing the
paper's evaluation section (see DESIGN.md Section 5 for the table index)."""
