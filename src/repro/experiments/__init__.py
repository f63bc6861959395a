"""Experiment harnesses: one module per table of the paper's Section 5
(see DESIGN.md section 5 for the table-by-table index)."""
