"""Ver's core components (paper Sections III–V + Appendix B/C)."""
