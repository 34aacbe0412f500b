"""Non-sampling comparators (PIM — partwise independence model)."""
