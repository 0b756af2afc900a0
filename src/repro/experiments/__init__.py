"""Table harnesses: one function per evaluation table (§VI)."""
