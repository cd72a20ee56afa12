"""Per-table reproduction harnesses (Tables 3, 4, 5 and Expt 6)."""
