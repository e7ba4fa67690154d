"""Table harnesses: each module reproduces one table of the paper's §5."""
