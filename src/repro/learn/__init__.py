"""SFC learning algorithms: LBMC (Section 5) and competitor learners."""
