"""DataVinci core: pattern learning, error detection, and edit-program repair."""
