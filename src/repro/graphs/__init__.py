"""Graph substrate: synthetic generators (paper §5.2 stand-ins) and stats."""
