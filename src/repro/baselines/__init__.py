"""Comparator partitioners: random/range (Sec 7.3) and Bottom-Up [45]."""
